"""Influence maximization (S12-S13): spread estimation, greedy, CELF."""
from repro.im.celf import CELFResult, celf
from repro.im.greedy import GreedyResult, greedy
from repro.im.spread import (
    estimate_spread,
    make_sigma,
    marginal_gains_spark,
    trial_seed_block,
)

__all__ = [
    "celf",
    "CELFResult",
    "greedy",
    "GreedyResult",
    "estimate_spread",
    "make_sigma",
    "marginal_gains_spark",
    "trial_seed_block",
]
