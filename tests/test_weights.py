"""Unit tests for edge-weight models (S3)."""
import numpy as np
import pytest

from repro.graphs.csr import build_csr
from repro.graphs.generators import erdos_renyi
from repro.graphs.weights import (
    EWM_NAMES,
    TRIVALENCY_CHOICES,
    edge_weights,
    normalize_for_lt,
    trivalency,
    uniform_random,
    weighted_cascade,
)

from tests.helpers import from_edges, star, tiny4


@pytest.fixture(scope="module")
def csr():
    return build_csr(erdos_renyi(100, 0.06, seed=8))


class TestTrivalency:
    def test_values_from_constant_set(self, csr):
        w = trivalency(csr, seed=0)
        assert w.shape == (csr.m,)
        assert set(np.unique(w)).issubset(set(TRIVALENCY_CHOICES))

    def test_all_three_values_appear(self, csr):
        w = trivalency(csr, seed=0)
        assert set(np.unique(w)) == set(TRIVALENCY_CHOICES)

    def test_deterministic(self, csr):
        assert np.array_equal(trivalency(csr, seed=1), trivalency(csr, seed=1))
        assert not np.array_equal(trivalency(csr, seed=1), trivalency(csr, seed=2))


class TestUniformRandom:
    def test_range(self, csr):
        w = uniform_random(csr, seed=0)
        assert w.shape == (csr.m,)
        assert (w >= 0).all() and (w < 1).all()

    def test_mean_near_half(self, csr):
        assert abs(uniform_random(csr, seed=3).mean() - 0.5) < 0.1

    def test_deterministic(self, csr):
        assert np.array_equal(uniform_random(csr, seed=4), uniform_random(csr, seed=4))


class TestWeightedCascade:
    def test_inverse_in_degree(self, csr):
        w = weighted_cascade(csr)
        indeg = csr.in_degree()
        for eid, dst in enumerate(csr.indices.tolist()):
            assert w[eid] == pytest.approx(1.0 / indeg[dst])

    def test_incoming_sums_to_one(self, csr):
        w = weighted_cascade(csr)
        sums = np.zeros(csr.n)
        np.add.at(sums, csr.indices, w)
        has_in = csr.in_degree() > 0
        assert np.allclose(sums[has_in], 1.0)

    def test_star(self):
        w = weighted_cascade(star(5))
        assert np.allclose(w, 1.0)  # each leaf has in-degree 1


class TestDispatch:
    @pytest.mark.parametrize("ewm", EWM_NAMES)
    def test_dispatch_shapes(self, csr, ewm):
        assert edge_weights(csr, ewm, seed=0).shape == (csr.m,)

    def test_unknown_rejected(self, csr):
        with pytest.raises(ValueError, match="unknown EWM"):
            edge_weights(csr, "XX")

    def test_tv_matches_direct(self, csr):
        assert np.array_equal(edge_weights(csr, "TV", seed=5), trivalency(csr, seed=5))


class TestNormalizeForLT:
    def test_wc_untouched(self, csr):
        w = weighted_cascade(csr)
        assert np.array_equal(normalize_for_lt(csr, w), w)

    @pytest.mark.parametrize("ewm", ["TV", "UR"])
    def test_incoming_sum_at_most_one(self, csr, ewm):
        w = normalize_for_lt(csr, edge_weights(csr, ewm, seed=0))
        sums = np.zeros(csr.n)
        np.add.at(sums, csr.indices, w)
        assert (sums <= 1.0 + 1e-12).all()

    def test_under_one_untouched(self):
        csr = from_edges(3, [[0, 2], [1, 2]])
        w = np.array([0.3, 0.4])
        assert np.array_equal(normalize_for_lt(csr, w), w)

    def test_over_one_scaled_proportionally(self):
        csr = from_edges(3, [[0, 2], [1, 2]])
        w = np.array([1.0, 3.0])
        out = normalize_for_lt(csr, w)
        assert out == pytest.approx([0.25, 0.75])

    def test_shape_validation(self, csr):
        with pytest.raises(ValueError):
            normalize_for_lt(csr, np.ones(3))


class TestWeightsOnTiny:
    def test_tiny_wc_exact(self):
        csr = tiny4()
        w = weighted_cascade(csr)
        indeg = csr.in_degree()
        sums = np.zeros(4)
        np.add.at(sums, csr.indices, w)
        assert np.allclose(sums[indeg > 0], 1.0)
