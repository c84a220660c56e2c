"""Edge-weight models (EWMs) from the paper's benchmarks (S3 in DESIGN.md).

All three return a ``(m,)`` float64 array indexed by CSR edge id:

* **TV** (trivalency, Goyal et al.): each weight drawn uniformly from
  ``{0.1, 0.01, 0.001}``.
* **UR** (uniformly random): each weight drawn uniformly from ``[0, 1]``.
* **WC** (weighted cascade, Kempe et al.): weight of edge ``(u, v)`` is
  ``1 / in_degree(v)``.

TV/UR are deterministic in ``seed``. For the LT model the paper requires
incoming weights to sum to at most 1; :func:`normalize_for_lt` rescales
each node's incoming weights by ``1 / max(1, sum)`` (WC already sums to
exactly 1 per node with in-edges).
"""
from __future__ import annotations

import numpy as np

from repro.graphs.csr import CSRGraph

TRIVALENCY_CHOICES = (0.1, 0.01, 0.001)

EWM_NAMES = ("TV", "UR", "WC")


def trivalency(csr: CSRGraph, *, seed: int = 0) -> np.ndarray:
    """Trivalency weights: uniform choice from {0.1, 0.01, 0.001} per edge."""
    rng = np.random.default_rng(seed)
    return rng.choice(np.asarray(TRIVALENCY_CHOICES), size=csr.m)


def uniform_random(csr: CSRGraph, *, seed: int = 0) -> np.ndarray:
    """Uniformly random weights in [0, 1) per edge."""
    rng = np.random.default_rng(seed)
    return rng.random(csr.m)


def weighted_cascade(csr: CSRGraph) -> np.ndarray:
    """Weighted-cascade weights: 1 / in_degree(dst) per edge (no RNG)."""
    indeg = csr.in_degree().astype(np.float64)
    return 1.0 / indeg[csr.indices]


def edge_weights(csr: CSRGraph, ewm: str, *, seed: int = 0) -> np.ndarray:
    """Dispatch by EWM name ('TV' | 'UR' | 'WC')."""
    if ewm == "TV":
        return trivalency(csr, seed=seed)
    if ewm == "UR":
        return uniform_random(csr, seed=seed)
    if ewm == "WC":
        return weighted_cascade(csr)
    raise ValueError(f"unknown EWM {ewm!r}; expected one of {EWM_NAMES}")


def normalize_for_lt(csr: CSRGraph, weights: np.ndarray) -> np.ndarray:
    """Rescale weights so each node's incoming sum is <= 1 (LT precondition).

    Each node v with incoming sum s > 1 has all its incoming weights
    divided by s; nodes already satisfying the constraint are untouched,
    so WC weights pass through unchanged.
    """
    weights = np.asarray(weights, np.float64)
    if weights.shape != (csr.m,):
        raise ValueError(f"weights must be ({csr.m},), got {weights.shape}")
    incoming_sum = np.zeros(csr.n, np.float64)
    np.add.at(incoming_sum, csr.indices, weights)
    # Tolerate float-summation excess (WC sums to 1 +/- a few ulps): only
    # rescale nodes whose incoming weight genuinely exceeds 1.
    needs_scale = incoming_sum > 1.0 + 1e-9
    scale = np.where(needs_scale, 1.0 / np.maximum(incoming_sum, 1e-300), 1.0)
    return weights * scale[csr.indices]
