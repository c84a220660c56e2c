"""Unit tests for CSR graph storage (S2)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graphs.csr import build_csr
from repro.graphs.generators import DirectedEdgeList, erdos_renyi

from tests.helpers import from_edges, line, star, tiny4


class TestBuildCSR:
    def test_simple(self):
        csr = from_edges(3, [[0, 1], [0, 2], [1, 2]])
        assert csr.n == 3 and csr.m == 3
        assert csr.indptr.tolist() == [0, 2, 3, 3]
        assert csr.indices.tolist() == [1, 2, 2]

    def test_stable_within_source(self):
        # destinations keep input order within a source: edge ids stable.
        csr = from_edges(4, [[1, 3], [0, 2], [1, 0], [0, 1]])
        eids, dsts = csr.out_edges(0)
        assert dsts.tolist() == [2, 1]  # input order preserved
        eids1, dsts1 = csr.out_edges(1)
        assert dsts1.tolist() == [3, 0]

    def test_isolated_nodes(self):
        csr = from_edges(5, [[0, 4]])
        assert csr.out_degree().tolist() == [1, 0, 0, 0, 0]
        assert csr.in_degree().tolist() == [0, 0, 0, 0, 1]

    def test_edge_array_roundtrip(self):
        g = erdos_renyi(60, 0.1, seed=0)
        csr = build_csr(g)
        got = {tuple(r) for r in csr.edge_array().tolist()}
        want = {tuple(r) for r in g.edges.tolist()}
        assert got == want

    def test_edge_sources_matches_indptr(self):
        csr = tiny4()
        src = csr.edge_sources()
        for u in range(csr.n):
            eids, _ = csr.out_edges(u)
            assert (src[eids] == u).all()

    def test_degree_sums(self):
        csr = build_csr(erdos_renyi(80, 0.05, seed=2))
        assert csr.out_degree().sum() == csr.m
        assert csr.in_degree().sum() == csr.m


class TestReverseCSR:
    def test_in_edges_simple(self):
        csr = from_edges(3, [[0, 2], [1, 2], [0, 1]])
        rev = csr.reverse()
        eids, srcs = rev.in_edges(2)
        assert set(srcs.tolist()) == {0, 1}
        # orig_eid maps back to the forward edge destinations
        assert (csr.indices[eids] == 2).all()

    def test_reverse_roundtrip_random(self):
        csr = build_csr(erdos_renyi(50, 0.1, seed=3))
        rev = csr.reverse()
        fwd_src = csr.edge_sources()
        for v in range(csr.n):
            eids, srcs = rev.in_edges(v)
            assert (csr.indices[eids] == v).all()
            assert (fwd_src[eids] == srcs).all()

    def test_reverse_covers_all_edges_once(self):
        csr = tiny4()
        rev = csr.reverse()
        assert sorted(rev.orig_eid.tolist()) == list(range(csr.m))

    def test_reverse_degrees(self):
        csr = build_csr(erdos_renyi(40, 0.15, seed=4))
        rev = csr.reverse()
        assert (np.diff(rev.indptr) == csr.in_degree()).all()


class TestHelpers:
    def test_line_structure(self):
        csr = line(5)
        assert csr.m == 4
        assert csr.out_degree().tolist() == [1, 1, 1, 1, 0]

    def test_star_structure(self):
        csr = star(6)
        assert csr.n == 7 and csr.m == 6
        assert csr.out_degree()[0] == 6
        assert csr.in_degree()[1:].tolist() == [1] * 6


@settings(max_examples=30, deadline=None)
@given(st.data())
def test_csr_roundtrip_property(data):
    """Any dedup'd directed edge list round-trips through CSR."""
    n = data.draw(st.integers(2, 15))
    pairs = data.draw(
        st.sets(
            st.tuples(st.integers(0, n - 1), st.integers(0, n - 1)).filter(
                lambda t: t[0] != t[1]
            ),
            max_size=40,
        )
    )
    edges = np.asarray(sorted(pairs), np.int64).reshape(-1, 2)
    csr = build_csr(DirectedEdgeList(n=n, edges=edges, name="prop"))
    assert csr.m == len(pairs)
    got = {tuple(r) for r in csr.edge_array().tolist()}
    assert got == pairs
