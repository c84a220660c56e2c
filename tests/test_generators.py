"""Unit tests for the deterministic graph generators (S1)."""
import numpy as np
import pytest

from repro.graphs.generators import (
    DirectedEdgeList,
    barabasi_albert,
    erdos_renyi,
    facebook_like,
    random_regular,
    watts_strogatz,
)


def _as_set(edges: np.ndarray) -> set[tuple[int, int]]:
    return {(int(u), int(v)) for u, v in edges}


def _assert_valid_directed(g: DirectedEdgeList) -> None:
    e = g.edges
    assert e.dtype == np.int64
    assert (e[:, 0] != e[:, 1]).all(), "self-loop present"
    assert len(_as_set(e)) == len(e), "duplicate directed edge"
    assert e.min() >= 0 and e.max() < g.n


def _assert_symmetric(g: DirectedEdgeList) -> None:
    s = _as_set(g.edges)
    assert all((v, u) in s for u, v in s), "undirected expansion not symmetric"


class TestErdosRenyi:
    @pytest.mark.parametrize("seed", [0, 1, 2, 3])
    def test_valid_and_symmetric(self, seed):
        g = erdos_renyi(150, 0.05, seed=seed)
        _assert_valid_directed(g)
        _assert_symmetric(g)

    @pytest.mark.parametrize("n,p", [(50, 0.1), (200, 0.02), (400, 0.01)])
    def test_edge_count_near_expectation(self, n, p):
        g = erdos_renyi(n, p, seed=9)
        expected = n * (n - 1) * p  # directed count = 2 * C(n,2) * p
        assert 0.5 * expected < g.m < 1.5 * expected

    def test_deterministic_in_seed(self):
        a = erdos_renyi(100, 0.05, seed=5)
        b = erdos_renyi(100, 0.05, seed=5)
        c = erdos_renyi(100, 0.05, seed=6)
        assert np.array_equal(a.edges, b.edges)
        assert not np.array_equal(a.edges, c.edges)

    def test_p_zero_gives_empty(self):
        assert erdos_renyi(20, 0.0, seed=0).m == 0

    def test_p_one_gives_complete(self):
        g = erdos_renyi(12, 1.0, seed=0)
        assert g.m == 12 * 11

    def test_name(self):
        assert erdos_renyi(10, 0.1, seed=0).name == "Erdős-Rényi"


class TestWattsStrogatz:
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_valid_and_symmetric(self, seed):
        g = watts_strogatz(120, 6, 0.1, seed=seed)
        _assert_valid_directed(g)
        _assert_symmetric(g)

    def test_no_rewiring_is_ring_lattice(self):
        n, k = 30, 4
        g = watts_strogatz(n, k, 0.0, seed=0)
        s = _as_set(g.edges)
        for u in range(n):
            for j in range(1, k // 2 + 1):
                assert (u, (u + j) % n) in s
        assert g.m == n * k

    def test_edge_count_preserved_by_rewiring(self):
        # Rewiring replaces edges one-for-one (minus rare dedupe skips).
        n, k = 200, 6
        g = watts_strogatz(n, k, 0.3, seed=1)
        assert n * k * 0.95 <= g.m <= n * k

    def test_odd_k_rejected(self):
        with pytest.raises(ValueError):
            watts_strogatz(20, 3, 0.1)

    def test_k_too_large_rejected(self):
        with pytest.raises(ValueError):
            watts_strogatz(10, 10, 0.1)

    def test_deterministic(self):
        a = watts_strogatz(80, 4, 0.2, seed=3)
        b = watts_strogatz(80, 4, 0.2, seed=3)
        assert np.array_equal(a.edges, b.edges)


class TestRandomRegular:
    @pytest.mark.parametrize("n,d", [(50, 3), (100, 4), (200, 7), (501, 4)])
    def test_exact_degrees(self, n, d):
        g = random_regular(n, d, seed=1)
        _assert_valid_directed(g)
        _assert_symmetric(g)
        outdeg = np.bincount(g.edges[:, 0], minlength=n)
        indeg = np.bincount(g.edges[:, 1], minlength=n)
        assert (outdeg == d).all()
        assert (indeg == d).all()

    def test_directed_edge_count(self):
        g = random_regular(100, 7, seed=0)
        assert g.m == 100 * 7  # n*d/2 undirected -> n*d directed

    def test_odd_product_rejected(self):
        with pytest.raises(ValueError):
            random_regular(9, 3)

    def test_deterministic(self):
        a = random_regular(60, 4, seed=2)
        b = random_regular(60, 4, seed=2)
        assert np.array_equal(a.edges, b.edges)

    def test_default_name_mentions_degree(self):
        assert "7-regular" in random_regular(20, 7, seed=0).name


class TestBarabasiAlbert:
    def test_edge_count_formula(self):
        g = barabasi_albert(300, 5, seed=0)
        # m_attach * (n - m_attach) undirected edges, doubled.
        assert g.m == 2 * 5 * (300 - 5)

    @pytest.mark.parametrize("seed", [0, 7])
    def test_valid_and_symmetric(self, seed):
        g = barabasi_albert(150, 3, seed=seed)
        _assert_valid_directed(g)
        _assert_symmetric(g)

    def test_heavy_tail(self):
        g = barabasi_albert(500, 4, seed=1)
        deg = np.bincount(g.edges[:, 0], minlength=g.n)
        # preferential attachment: max degree far above the mean
        assert deg.max() > 5 * deg.mean()

    def test_invalid_m_rejected(self):
        with pytest.raises(ValueError):
            barabasi_albert(10, 0)
        with pytest.raises(ValueError):
            barabasi_albert(10, 10)


class TestFacebookLike:
    def test_matches_paper_scale(self):
        g = facebook_like(seed=0)
        assert g.n == 4039  # SNAP ego-Facebook node count
        und = g.m // 2
        # paper: 88,234 undirected edges; BA substitute gives 88,374
        assert abs(und - 88234) < 500
        assert g.name == "Facebook"


class TestDirectedEdgeList:
    def test_shape_validation(self):
        with pytest.raises(ValueError):
            DirectedEdgeList(n=3, edges=np.zeros((2, 3), np.int64), name="bad")

    def test_range_validation(self):
        with pytest.raises(ValueError):
            DirectedEdgeList(n=2, edges=np.array([[0, 5]]), name="bad")

    def test_m_property(self):
        g = DirectedEdgeList(n=3, edges=np.array([[0, 1], [1, 2]]), name="ok")
        assert g.m == 2
