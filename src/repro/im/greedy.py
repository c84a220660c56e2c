"""Plain greedy influence maximization (Nemhauser et al. baseline).

Evaluates sigma-hat(S + {v}) for every remaining candidate at every step;
CELF's whole point is avoiding most of these evaluations, so this module
exists both as the correctness reference for CELF and to count how many
sigma evaluations CELF saves.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Sequence


@dataclass(frozen=True)
class GreedyResult:
    """Selected seeds in pick order, sigma-hat after each pick, eval count."""

    seeds: list[int]
    sigma_values: list[float]
    n_evals: int


def greedy(
    sigma: Callable[[Sequence[int]], float], candidates: Sequence[int], k: int
) -> GreedyResult:
    """Select k seeds maximizing sigma greedily (ties -> smallest node id)."""
    if k <= 0 or k > len(candidates):
        raise ValueError(f"need 0 < k <= {len(candidates)}")
    chosen: list[int] = []
    values: list[float] = []
    remaining = sorted(int(c) for c in candidates)
    n_evals = 0
    current = 0.0
    for _ in range(k):
        best_node, best_val = None, -1.0
        for v in remaining:
            val = sigma(chosen + [v])
            n_evals += 1
            if val > best_val:
                best_node, best_val = v, val
        chosen.append(best_node)
        remaining.remove(best_node)
        current = best_val
        values.append(current)
    return GreedyResult(seeds=chosen, sigma_values=values, n_evals=n_evals)
