"""Deterministic graph generators (S1 in DESIGN.md).

Each generator returns a :class:`DirectedEdgeList` — ``n`` nodes and an
``(m, 2)`` int64 array of *directed* edges. The paper treats every
undirected edge as two directed edges, so undirected models are expanded
both ways here. All generators are deterministic in ``seed`` (NumPy
``default_rng``), standing in for the NetworkX generators the paper uses
(NetworkX itself is not a runtime dependency of the reproduction).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class DirectedEdgeList:
    """A graph as a directed edge list.

    Attributes:
        n: number of nodes, ids ``0..n-1``.
        edges: ``(m, 2)`` int64 array; row ``(u, v)`` is the directed edge
            ``u -> v``. No self-loops, no duplicate directed edges.
        name: human-readable label used in benchmark table rows.
    """

    n: int
    edges: np.ndarray
    name: str

    @property
    def m(self) -> int:
        """Number of directed edges."""
        return int(self.edges.shape[0])

    def __post_init__(self) -> None:
        e = self.edges
        if e.ndim != 2 or e.shape[1] != 2:
            raise ValueError(f"edges must be (m, 2), got {e.shape}")
        if e.size and (e.min() < 0 or e.max() >= self.n):
            raise ValueError("edge endpoint out of range")


def _to_directed(n: int, und: np.ndarray, name: str) -> DirectedEdgeList:
    """Expand undirected edges (u < v rows) into both directed orientations."""
    und = np.asarray(und, dtype=np.int64).reshape(-1, 2)
    both = np.concatenate([und, und[:, ::-1]], axis=0)
    return DirectedEdgeList(n=n, edges=both, name=name)


def _dedupe_undirected(n: int, pairs: np.ndarray) -> np.ndarray:
    """Canonicalize to u < v, drop self-loops and duplicates."""
    pairs = np.asarray(pairs, dtype=np.int64).reshape(-1, 2)
    lo = np.minimum(pairs[:, 0], pairs[:, 1])
    hi = np.maximum(pairs[:, 0], pairs[:, 1])
    keep = lo != hi
    keys = np.unique(lo[keep] * np.int64(n) + hi[keep])
    return np.stack([keys // n, keys % n], axis=1)


def erdos_renyi(n: int, p: float, *, seed: int = 0, name: str = "Erdős-Rényi") -> DirectedEdgeList:
    """Undirected G(n, p), expanded to directed edges both ways.

    Samples the upper triangle row-by-row to bound peak memory at O(n)
    per row rather than materializing all n(n-1)/2 pairs at once.
    """
    rng = np.random.default_rng(seed)
    chunks = []
    for u in range(n - 1):
        hits = np.nonzero(rng.random(n - 1 - u) < p)[0]
        if hits.size:
            chunks.append(np.stack([np.full(hits.size, u, np.int64), u + 1 + hits], axis=1))
    und = np.concatenate(chunks, axis=0) if chunks else np.empty((0, 2), np.int64)
    return _to_directed(n, und, name)


def watts_strogatz(
    n: int, k: int, p_rewire: float, *, seed: int = 0, name: str = "Watts-Strogatz"
) -> DirectedEdgeList:
    """Undirected Watts–Strogatz small-world graph.

    Ring lattice where each node connects to its ``k // 2`` clockwise
    neighbors; each lattice edge ``(u, (u + j) % n)`` is rewired to a
    uniformly random non-duplicate target with probability ``p_rewire``
    (the standard NetworkX construction).
    """
    if k % 2 or k >= n:
        raise ValueError("k must be even and < n")
    rng = np.random.default_rng(seed)
    # adjacency set for duplicate checks during rewiring
    neigh: list[set[int]] = [set() for _ in range(n)]
    edges: list[tuple[int, int]] = []
    for j in range(1, k // 2 + 1):
        for u in range(n):
            v = (u + j) % n
            edges.append((u, v))
            neigh[u].add(v)
            neigh[v].add(u)
    rewired: list[tuple[int, int]] = []
    for u, v in edges:
        if rng.random() < p_rewire:
            w = int(rng.integers(0, n))
            # skip rewiring if the node is saturated (can't avoid duplicates)
            tries = 0
            while (w == u or w in neigh[u]) and tries < 8 * n:
                w = int(rng.integers(0, n))
                tries += 1
            if w != u and w not in neigh[u]:
                neigh[u].discard(v)
                neigh[v].discard(u)
                neigh[u].add(w)
                neigh[w].add(u)
                rewired.append((u, w))
                continue
        rewired.append((u, v))
    und = _dedupe_undirected(n, np.asarray(rewired, np.int64))
    return _to_directed(n, und, name)


def random_regular(n: int, d: int, *, seed: int = 0, name: str | None = None) -> DirectedEdgeList:
    """Undirected random d-regular graph via configuration model + repair.

    Pairs ``n * d`` stubs uniformly at random, then removes self-loops and
    parallel edges with random double-edge swaps (which preserve every
    degree). Deterministic in ``seed``; raises if repair fails to converge,
    which does not happen for the sparse regimes used here (d << n).
    """
    if (n * d) % 2:
        raise ValueError("n * d must be even")
    rng = np.random.default_rng(seed)
    for _attempt in range(20):
        stubs = np.repeat(np.arange(n, dtype=np.int64), d)
        rng.shuffle(stubs)
        e = stubs.reshape(-1, 2)
        for _sweep in range(500):
            lo = np.minimum(e[:, 0], e[:, 1])
            hi = np.maximum(e[:, 0], e[:, 1])
            key = lo * np.int64(n) + hi
            _, first_idx, counts = np.unique(key, return_index=True, return_counts=True)
            dup_mask = np.ones(len(e), bool)
            dup_mask[first_idx] = False  # later copies of a parallel edge
            bad = np.nonzero((lo == hi) | dup_mask)[0]
            if bad.size == 0:
                und = np.stack([lo, hi], axis=1)
                label = name or f"Random {d}-regular"
                return _to_directed(n, _dedupe_undirected(n, und), label)
            partners = rng.integers(0, len(e), size=bad.size)
            for i, j in zip(bad, partners):
                if i == j:
                    continue
                a, b = e[i]
                c, dd = e[j]
                if rng.random() < 0.5:
                    e[i] = (a, c)
                    e[j] = (b, dd)
                else:
                    e[i] = (a, dd)
                    e[j] = (b, c)
    raise RuntimeError("random_regular repair did not converge")


def barabasi_albert(
    n: int, m_attach: int, *, seed: int = 0, name: str = "Barabási-Albert"
) -> DirectedEdgeList:
    """Undirected Barabási–Albert preferential-attachment graph.

    Starts from ``m_attach`` isolated nodes; each new node attaches to
    ``m_attach`` distinct existing nodes sampled proportionally to degree
    (via the standard repeated-nodes list), giving ``m_attach * (n -
    m_attach)`` undirected edges and a heavy-tailed degree distribution.
    """
    if not 1 <= m_attach < n:
        raise ValueError("need 1 <= m_attach < n")
    rng = np.random.default_rng(seed)
    repeated: list[int] = []
    targets = list(range(m_attach))
    rows: list[tuple[int, int]] = []
    for src in range(m_attach, n):
        rows.extend((src, t) for t in targets)
        repeated.extend(targets)
        repeated.extend([src] * m_attach)
        picked: set[int] = set()
        while len(picked) < m_attach:
            picked.add(repeated[int(rng.integers(0, len(repeated)))])
        targets = sorted(picked)
    und = _dedupe_undirected(n, np.asarray(rows, np.int64))
    return _to_directed(n, und, name)


def facebook_like(*, seed: int = 0) -> DirectedEdgeList:
    """Synthetic stand-in for the SNAP ego-Facebook graph (no network access).

    Matches the paper's node count (4,039) and approximates its edge count
    (88,234 undirected; this gives 22 * (4039 - 22) = 88,374) with a
    heavy-tailed degree distribution via Barabási–Albert attachment.
    Documented as a substitution in DESIGN.md §4.
    """
    g = barabasi_albert(4039, 22, seed=seed, name="Facebook")
    return g
