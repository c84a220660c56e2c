"""Influence-maximization tests: spread estimation, greedy, CELF (S12-S13)."""
import numpy as np
import pytest

from repro.diffusion import make_engine
from repro.graphs.csr import build_csr
from repro.graphs.generators import erdos_renyi, random_regular
from repro.graphs.weights import edge_weights
from repro.im import celf, greedy, make_sigma, trial_seed_block
from repro.im.spread import estimate_spread

from tests.helpers import line, star


@pytest.fixture(scope="module")
def setup():
    csr = build_csr(erdos_renyi(120, 0.04, seed=5))
    w = edge_weights(csr, "WC")
    engine = make_engine("csr", csr, w, model="ic")
    sigma = make_sigma(engine, trial_seed_block(2, 150))
    return csr, w, engine, sigma


class TestTrialSeedBlock:
    def test_deterministic(self):
        assert np.array_equal(trial_seed_block(1, 50), trial_seed_block(1, 50))

    def test_distinct_within_block(self):
        b = trial_seed_block(0, 10_000)
        assert len(np.unique(b)) == 10_000

    def test_disjoint_across_bases(self):
        a = set(trial_seed_block(1, 1000).tolist())
        b = set(trial_seed_block(2, 1000).tolist())
        assert not (a & b)

    def test_non_negative(self):
        assert (trial_seed_block(3, 100) >= 0).all()


class TestEstimateSpread:
    def test_bounds(self, setup):
        csr, w, engine, _ = setup
        est = estimate_spread(engine, [0, 1, 2], trial_seed_block(0, 50))
        assert 3 <= est <= csr.n

    def test_deterministic(self, setup):
        _, _, engine, _ = setup
        block = trial_seed_block(1, 30)
        assert estimate_spread(engine, [4], block) == estimate_spread(
            engine, [4], block
        )

    def test_full_flood(self):
        csr = line(5)
        engine = make_engine("csr", csr, np.ones(csr.m))
        assert estimate_spread(engine, [0], trial_seed_block(0, 10)) == 5.0


class TestGreedy:
    def test_star_hub_wins(self):
        csr = star(10)
        engine = make_engine("csr", csr, np.full(csr.m, 0.9))
        sigma = make_sigma(engine, trial_seed_block(1, 100))
        res = greedy(sigma, range(csr.n), 1)
        assert res.seeds == [0]
        assert res.n_evals == csr.n

    def test_values_monotone(self, setup):
        *_, sigma = setup
        res = greedy(sigma, range(30), 4)
        assert all(b >= a for a, b in zip(res.sigma_values, res.sigma_values[1:]))

    def test_eval_count(self, setup):
        *_, sigma = setup
        res = greedy(sigma, range(20), 3)
        assert res.n_evals == 20 + 19 + 18

    def test_k_validation(self, setup):
        *_, sigma = setup
        with pytest.raises(ValueError):
            greedy(sigma, range(5), 0)
        with pytest.raises(ValueError):
            greedy(sigma, range(5), 6)

    def test_no_duplicate_seeds(self, setup):
        *_, sigma = setup
        res = greedy(sigma, range(25), 5)
        assert len(set(res.seeds)) == 5


class TestCELF:
    def test_matches_greedy_exactly(self, setup):
        """CRN-IC sigma-hat is exactly submodular, so lazy == eager."""
        csr, *_ , sigma = setup
        g = greedy(sigma, range(csr.n), 5)
        c = celf(sigma, range(csr.n), 5)
        assert c.seeds == g.seeds
        assert np.allclose(c.sigma_values, g.sigma_values)

    def test_fewer_evaluations_than_greedy(self, setup):
        csr, *_, sigma = setup
        g = greedy(sigma, range(csr.n), 5)
        c = celf(sigma, range(csr.n), 5)
        assert c.n_evals < g.n_evals

    def test_initial_gains_path_equivalent(self, setup):
        csr, *_, sigma = setup
        base = celf(sigma, range(csr.n), 4)
        gains = {v: sigma([v]) for v in range(csr.n)}
        pre = celf(sigma, range(csr.n), 4, initial_gains=gains)
        assert pre.seeds == base.seeds
        assert np.allclose(pre.sigma_values, base.sigma_values)
        # precomputed path skips the first |candidates| evaluations
        assert pre.n_evals == base.n_evals - csr.n

    def test_initial_gains_missing_candidate_rejected(self, setup):
        *_, sigma = setup
        with pytest.raises(ValueError, match="missing"):
            celf(sigma, range(10), 2, initial_gains={0: 1.0})

    def test_k_validation(self, setup):
        *_, sigma = setup
        with pytest.raises(ValueError):
            celf(sigma, range(5), 0)

    def test_k_one_picks_argmax(self, setup):
        csr, *_, sigma = setup
        c = celf(sigma, range(csr.n), 1)
        best = max(range(csr.n), key=lambda v: (sigma([v]), -v))
        assert c.seeds == [best]

    def test_values_monotone(self, setup):
        csr, *_, sigma = setup
        c = celf(sigma, range(csr.n), 6)
        assert all(b >= a for a, b in zip(c.sigma_values, c.sigma_values[1:]))

    def test_deterministic(self, setup):
        csr, *_, sigma = setup
        assert celf(sigma, range(csr.n), 3).seeds == celf(sigma, range(csr.n), 3).seeds


class TestCELFOnRegularGraph:
    """Table 2's setting at test scale: all backends pick identical seeds."""

    def test_backends_agree(self):
        csr = build_csr(random_regular(80, 5, seed=1))
        w = edge_weights(csr, "TV", seed=2)
        block = trial_seed_block(3, 60)
        picks = {}
        for kind in ("csr", "pure_python", "ndlib_like"):
            sigma = make_sigma(make_engine(kind, csr, w), block)
            picks[kind] = celf(sigma, range(csr.n), 3).seeds
        assert picks["csr"] == picks["pure_python"] == picks["ndlib_like"]
