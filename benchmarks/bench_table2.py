"""pytest-benchmark target for Table 2 — CELF run-times per backend.

One benchmark per (EWM, backend) cell at the benchmark scale
(``REPRO_CELF_N`` nodes, ``REPRO_CELF_MC`` Monte-Carlo samples; paper
scale is n=5000 via ``jobs/table2.py``). The NDlib cell reproduces the
paper's DNF finding by extrapolation rather than burning the timeout.
"""
import pytest

from repro.bench.table2 import (
    PAPER_NDLIB_TIMEOUT_S,
    bench_params,
    estimate_ndlib_celf_seconds,
    run_celf_timed,
    table2_graph,
)
from repro.bench.table2 import TABLE2_EWMS
from repro.graphs.weights import edge_weights

PARAMS = bench_params()
GRAPH = table2_graph(PARAMS["n"], PARAMS["d"], seed=42)
WEIGHTS = {ewm: edge_weights(GRAPH, ewm, seed=11) for ewm in TABLE2_EWMS}


@pytest.mark.parametrize("ewm", TABLE2_EWMS)
@pytest.mark.parametrize("backend", ("csr", "pure_python"))
def test_table2_cell(benchmark, ewm, backend):
    benchmark.extra_info.update(
        ewm=ewm, backend=backend, n=PARAMS["n"], k=PARAMS["k"], mc=PARAMS["mc"]
    )

    def run():
        row = run_celf_timed(
            GRAPH, WEIGHTS[ewm], backend, k=PARAMS["k"], mc=PARAMS["mc"]
        )
        benchmark.extra_info.update(seeds=row.seeds, n_evals=row.n_evals)
        return row

    benchmark.pedantic(run, rounds=1, iterations=1)


@pytest.mark.parametrize("ewm", TABLE2_EWMS)
def test_table2_spark_backend(benchmark, spark, ewm):
    """Extra (non-paper) cell: Spark-parallel CELF first pass."""
    benchmark.extra_info.update(ewm=ewm, backend="spark", **{
        k: PARAMS[k] for k in ("n", "k", "mc")
    })

    def run():
        return run_celf_timed(
            GRAPH, WEIGHTS[ewm], "spark", k=PARAMS["k"], mc=PARAMS["mc"], spark=spark
        )

    benchmark.pedantic(run, rounds=1, iterations=1)


@pytest.mark.parametrize("ewm", TABLE2_EWMS)
def test_table2_ndlib_dnf_extrapolation(benchmark, ewm):
    """Reproduce "NDlib did not finish in 5 minutes": time a few NDlib
    sigma evaluations (that is what the benchmark clock measures here)
    and record the extrapolated full-CELF first-pass cost."""

    def run():
        est = estimate_ndlib_celf_seconds(
            GRAPH, WEIGHTS[ewm], mc=PARAMS["mc"], sample_candidates=3
        )
        benchmark.extra_info.update(
            ewm=ewm,
            backend="ndlib_like",
            estimated_first_pass_seconds=round(est, 1),
            dnf_at_bench_scale=est > PAPER_NDLIB_TIMEOUT_S,
        )
        return est

    benchmark.pedantic(run, rounds=1, iterations=1)
