"""Shared fixtures-in-code for the test suite: small standard graphs."""
from __future__ import annotations

import numpy as np

from repro.graphs.csr import CSRGraph, build_csr
from repro.graphs.generators import DirectedEdgeList


def tiny4() -> CSRGraph:
    """4-node graph with 8 directed edges (cycle plus chords) — small
    enough for the 2^m exact-IC oracle."""
    edges = np.array(
        [[0, 1], [1, 2], [2, 3], [0, 2], [3, 0], [1, 3], [2, 0], [3, 1]], np.int64
    )
    return build_csr(DirectedEdgeList(n=4, edges=edges, name="tiny4"))


def line(n: int) -> CSRGraph:
    """Directed path 0 -> 1 -> ... -> n-1."""
    edges = np.stack([np.arange(n - 1), np.arange(1, n)], axis=1).astype(np.int64)
    return build_csr(DirectedEdgeList(n=n, edges=edges, name=f"line{n}"))


def star(n_leaves: int) -> CSRGraph:
    """Hub node 0 with directed edges to n_leaves leaves."""
    edges = np.stack(
        [np.zeros(n_leaves, np.int64), np.arange(1, n_leaves + 1)], axis=1
    )
    return build_csr(DirectedEdgeList(n=n_leaves + 1, edges=edges, name="star"))


def from_edges(n: int, pairs) -> CSRGraph:
    """CSR from an explicit directed edge list."""
    arr = np.asarray(pairs, np.int64).reshape(-1, 2)
    return build_csr(DirectedEdgeList(n=n, edges=arr, name="custom"))
