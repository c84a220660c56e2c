"""Compressed sparse row (CSR) graph storage (S2 in DESIGN.md).

This is the paper's core data structure: out-neighbors of each node stored
contiguously (``indices``) with an ``indptr`` offset array. The position of
a destination inside ``indices`` is the *edge id*; edge weights and the
deterministic coin streams (``repro.diffusion.rng``) are keyed by it, so a
CSR build must be byte-stable — we sort directed edges by source with a
stable sort, preserving input destination order within a source.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.graphs.generators import DirectedEdgeList


@dataclass(frozen=True)
class CSRGraph:
    """Directed graph in CSR form.

    Attributes:
        n: number of nodes.
        indptr: ``(n + 1,)`` int64; out-edges of ``u`` occupy edge ids
            ``indptr[u]..indptr[u+1]`` (half-open) in ``indices``.
        indices: ``(m,)`` int64 destinations; position == edge id.
        name: label carried over from the generator for table rows.
    """

    n: int
    indptr: np.ndarray
    indices: np.ndarray
    name: str = field(default="graph")

    @property
    def m(self) -> int:
        """Number of directed edges."""
        return int(self.indices.shape[0])

    def out_degree(self) -> np.ndarray:
        """Out-degree per node, ``(n,)`` int64."""
        return np.diff(self.indptr)

    def in_degree(self) -> np.ndarray:
        """In-degree per node, ``(n,)`` int64."""
        return np.bincount(self.indices, minlength=self.n).astype(np.int64)

    def out_edges(self, u: int) -> tuple[np.ndarray, np.ndarray]:
        """Return ``(edge_ids, destinations)`` of node ``u``'s out-edges."""
        s, e = int(self.indptr[u]), int(self.indptr[u + 1])
        return np.arange(s, e, dtype=np.int64), self.indices[s:e]

    def edge_sources(self) -> np.ndarray:
        """Source node per edge id, ``(m,)`` int64 (inverse of indptr)."""
        return np.repeat(np.arange(self.n, dtype=np.int64), self.out_degree())

    def edge_array(self) -> np.ndarray:
        """Directed edges as an ``(m, 2)`` array ordered by edge id."""
        return np.stack([self.edge_sources(), self.indices], axis=1)

    def reverse(self) -> "ReverseCSR":
        """CSR of the transpose, keeping the *original* edge ids.

        Needed by the LT live-edge sampler, which picks at most one
        incoming edge per node.
        """
        order = np.argsort(self.indices, kind="stable")
        rev_indptr = np.zeros(self.n + 1, np.int64)
        np.cumsum(np.bincount(self.indices, minlength=self.n), out=rev_indptr[1:])
        return ReverseCSR(
            n=self.n,
            indptr=rev_indptr,
            indices=self.edge_sources()[order],
            orig_eid=order.astype(np.int64),
        )


@dataclass(frozen=True)
class ReverseCSR:
    """In-edge view of a :class:`CSRGraph`.

    ``indices`` holds in-neighbor sources; ``orig_eid[k]`` is the id the
    k-th reverse slot has in the forward CSR, so forward-keyed weights and
    coins can be looked up from the reverse traversal.
    """

    n: int
    indptr: np.ndarray
    indices: np.ndarray
    orig_eid: np.ndarray

    def in_edges(self, v: int) -> tuple[np.ndarray, np.ndarray]:
        """Return ``(forward_edge_ids, source_nodes)`` of ``v``'s in-edges."""
        s, e = int(self.indptr[v]), int(self.indptr[v + 1])
        return self.orig_eid[s:e], self.indices[s:e]


def build_csr(g: DirectedEdgeList) -> CSRGraph:
    """Build a CSR graph from a directed edge list, stable in input order."""
    src = np.ascontiguousarray(g.edges[:, 0])
    dst = np.ascontiguousarray(g.edges[:, 1])
    order = np.argsort(src, kind="stable")
    indptr = np.zeros(g.n + 1, np.int64)
    np.cumsum(np.bincount(src, minlength=g.n), out=indptr[1:])
    return CSRGraph(n=g.n, indptr=indptr, indices=dst[order].astype(np.int64), name=g.name)
