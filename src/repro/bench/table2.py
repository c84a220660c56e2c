"""Table 2 driver — CELF run-times on a random 7-regular graph.

Paper workload: CELF selecting 10 seeds on a 5,000-node random 7-regular
graph (35,000 undirected edges), EWMs TV and WC; run-times in seconds
(CyNetDiff 2s/10s, pure Python 26s/153s, NDlib did not finish within 5
minutes). The engine-vs-engine *ratio* is the claim being reproduced;
graph size and Monte-Carlo sample count default smaller here (env
``REPRO_CELF_N`` / ``REPRO_CELF_MC``) and the paper scale is runnable via
``jobs/table2.py``. NDlib's DNF is reproduced by extrapolation: a few
NDlib-backed sigma evaluations are timed and scaled to CELF's first pass.
"""
from __future__ import annotations

import os
import time
from dataclasses import dataclass
from typing import Sequence

import numpy as np

from repro.diffusion import make_engine
from repro.graphs.csr import CSRGraph, build_csr
from repro.graphs.generators import random_regular
from repro.graphs.weights import edge_weights
from repro.im.celf import celf
from repro.im.spread import (
    estimate_spread,
    make_sigma,
    marginal_gains_spark,
    trial_seed_block,
)

# Paper Table 2, seconds. NDlib: did not finish within 300 s.
PAPER_TABLE2 = {
    ("TV", "csr"): 2.0,
    ("TV", "pure_python"): 26.0,
    ("WC", "csr"): 10.0,
    ("WC", "pure_python"): 153.0,
}
PAPER_NDLIB_TIMEOUT_S = 300.0
PAPER_N, PAPER_D, PAPER_K = 5000, 7, 10
TABLE2_EWMS = ("TV", "WC")


def bench_params() -> dict:
    """Benchmark-scale parameters (env-overridable; jobs use paper scale)."""
    return {
        "n": int(os.environ.get("REPRO_CELF_N", "1000")),
        "d": PAPER_D,
        "k": int(os.environ.get("REPRO_CELF_K", str(PAPER_K))),
        "mc": int(os.environ.get("REPRO_CELF_MC", "50")),
    }


def table2_graph(n: int = PAPER_N, d: int = PAPER_D, *, seed: int = 42) -> CSRGraph:
    """The random d-regular benchmark graph."""
    return build_csr(random_regular(n, d, seed=seed))


@dataclass(frozen=True)
class Table2Row:
    """One (EWM, backend) cell: wall-clock plus the selection itself."""

    ewm: str
    backend: str
    seconds: float
    seeds: list[int]
    sigma_value: float
    n_evals: int
    paper_seconds: float | None


def run_celf_timed(
    csr: CSRGraph,
    weights: np.ndarray,
    backend: str,
    *,
    k: int,
    mc: int,
    base_seed: int = 0,
    spark=None,
    model: str = "ic",
) -> Table2Row:
    """Time one CELF run end-to-end (sigma setup outside, selection inside).

    Backends: ``csr`` / ``pure_python`` / ``ndlib_like`` run everything
    locally; ``spark`` fans the first pass (one sigma per candidate — the
    dominant cost) out with ``marginal_gains_spark`` and does the lazy
    re-evaluations with the local CSR kernel.
    """
    block = trial_seed_block(base_seed, mc)
    candidates = list(range(csr.n))
    if backend == "spark":
        if spark is None:
            raise ValueError("spark backend needs a session")
        local = make_engine("csr", csr, weights, model=model)
        sigma = make_sigma(local, block)
        t0 = time.perf_counter()
        gains_pdf = marginal_gains_spark(
            spark, csr, weights, candidates, block, model=model
        ).toPandas()
        initial = dict(zip(gains_pdf["candidate"], gains_pdf["sigma_hat"]))
        res = celf(sigma, candidates, k, initial_gains=initial)
        secs = time.perf_counter() - t0
        n_evals = res.n_evals + len(candidates)
    else:
        engine = make_engine(backend, csr, weights, model=model)
        sigma = make_sigma(engine, block)
        t0 = time.perf_counter()
        res = celf(sigma, candidates, k)
        secs = time.perf_counter() - t0
        n_evals = res.n_evals
    return Table2Row(
        ewm="?",
        backend=backend,
        seconds=secs,
        seeds=res.seeds,
        sigma_value=res.sigma_values[-1],
        n_evals=n_evals,
        paper_seconds=None,
    )


def estimate_ndlib_celf_seconds(
    csr: CSRGraph,
    weights: np.ndarray,
    *,
    mc: int,
    base_seed: int = 0,
    sample_candidates: int = 5,
) -> float:
    """Extrapolated NDlib-backed CELF time (first pass alone, a lower bound).

    Times ``sample_candidates`` single-seed sigma evaluations with the
    NDlib-like engine and scales to all n candidates — the cheapest work
    CELF must do before any selection. Used to reproduce the paper's
    "did not finish within 5 minutes" finding without actually burning
    the 5 minutes.
    """
    engine = make_engine("ndlib_like", csr, weights, model="ic")
    block = trial_seed_block(base_seed, mc)
    rng = np.random.default_rng(0)
    cands = rng.choice(csr.n, size=sample_candidates, replace=False)
    t0 = time.perf_counter()
    for c in cands.tolist():
        estimate_spread(engine, [int(c)], block)
    per_candidate = (time.perf_counter() - t0) / sample_candidates
    return per_candidate * csr.n


def run_table2(
    *,
    backends: Sequence[str] = ("csr", "pure_python"),
    n: int | None = None,
    k: int | None = None,
    mc: int | None = None,
    graph_seed: int = 42,
    weight_seed: int = 11,
    spark=None,
) -> list[Table2Row]:
    """Produce all Table 2 cells at the configured scale."""
    p = bench_params()
    n = n if n is not None else p["n"]
    k = k if k is not None else p["k"]
    mc = mc if mc is not None else p["mc"]
    csr = table2_graph(n, p["d"], seed=graph_seed)
    rows: list[Table2Row] = []
    for ewm in TABLE2_EWMS:
        w = edge_weights(csr, ewm, seed=weight_seed)
        for backend in backends:
            row = run_celf_timed(csr, w, backend, k=k, mc=mc, spark=spark)
            rows.append(
                Table2Row(
                    ewm=ewm,
                    backend=backend,
                    seconds=row.seconds,
                    seeds=row.seeds,
                    sigma_value=row.sigma_value,
                    n_evals=row.n_evals,
                    paper_seconds=PAPER_TABLE2.get((ewm, backend)),
                )
            )
    return rows


def format_table2(rows: Sequence[Table2Row]) -> str:
    """Render cells as a markdown table mirroring the paper's layout."""
    lines = [
        "| EWM | backend | seconds (ours) | paper seconds | sigma-hat | evals | seeds |",
        "|---|---|---|---|---|---|---|",
    ]
    for r in rows:
        paper = f"{r.paper_seconds:.0f}" if r.paper_seconds is not None else "-"
        lines.append(
            f"| {r.ewm} | {r.backend} | {r.seconds:.2f} | {paper} "
            f"| {r.sigma_value:.2f} | {r.n_evals} | {r.seeds} |"
        )
    return "\n".join(lines)
