"""CELF — Cost-Effective Lazy Forward selection (Leskovec et al. 2007), S13.

The lazy-forward optimization of greedy: marginal gains are kept in a
max-heap and only re-evaluated when stale, exploiting submodularity
(a node's marginal gain can only shrink as S grows). With common random
numbers the IC estimate is exactly submodular, so CELF provably returns
the same seed set as plain greedy while evaluating sigma far fewer times
— the evaluation counter is part of the result so benchmarks can report
the savings.

The first pass still evaluates every candidate once; callers can supply
those values precomputed (``initial_gains``), which is how the Spark
backend parallelizes them via ``repro.im.spread.marginal_gains_spark``.
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass
from typing import Callable, Mapping, Sequence


@dataclass(frozen=True)
class CELFResult:
    """Seeds in pick order, sigma-hat after each pick, and eval count.

    ``n_evals`` counts calls made to ``sigma`` by this routine; when
    ``initial_gains`` was supplied, the first |candidates| evaluations
    happened elsewhere (e.g. on Spark) and are reported separately by the
    caller.
    """

    seeds: list[int]
    sigma_values: list[float]
    n_evals: int


def celf(
    sigma: Callable[[Sequence[int]], float],
    candidates: Sequence[int],
    k: int,
    *,
    initial_gains: Mapping[int, float] | None = None,
) -> CELFResult:
    """Select k seeds with lazy-forward greedy.

    Args:
        sigma: influence estimate over a seed set (use common random
            numbers for determinism; see ``repro.im.spread.make_sigma``).
        candidates: node ids to select from.
        k: number of seeds.
        initial_gains: optional precomputed sigma({v}) for every
            candidate (e.g. computed in parallel on Spark). When absent,
            the first pass evaluates them serially.

    Ties break toward the smaller node id, matching ``greedy``.
    """
    cand = sorted(int(c) for c in candidates)
    if k <= 0 or k > len(cand):
        raise ValueError(f"need 0 < k <= {len(cand)}")
    n_evals = 0
    # Heap entries: (-gain, node, round_valid_for). Initial gains are
    # relative to S = {} , i.e. fresh for selection round 1. Python's heap is
    # a min-heap, so gains are negated; the node id as the second key
    # gives deterministic smallest-id tie-breaking.
    heap: list[tuple[float, int, int]] = []
    if initial_gains is not None:
        missing = [v for v in cand if v not in initial_gains]
        if missing:
            raise ValueError(f"initial_gains missing candidates, e.g. {missing[:3]}")
        for v in cand:
            heap.append((-float(initial_gains[v]), v, 1))
    else:
        for v in cand:
            g = sigma([v])
            n_evals += 1
            heap.append((-g, v, 1))
    heapq.heapify(heap)

    chosen: list[int] = []
    values: list[float] = []
    current = 0.0
    for round_no in range(1, k + 1):
        while True:
            neg_gain, v, evaluated_at = heapq.heappop(heap)
            if evaluated_at == round_no:
                # Gain is fresh for the current S — by submodularity no
                # stale entry below it in the heap can beat it.
                chosen.append(v)
                current += -neg_gain
                values.append(current)
                break
            fresh = sigma(chosen + [v]) - current
            n_evals += 1
            heapq.heappush(heap, (-fresh, v, round_no))
    return CELFResult(seeds=chosen, sigma_values=values, n_evals=n_evals)
