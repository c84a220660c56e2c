"""Benchmark-harness tests (S15): simple_benchmark and table drivers.

These run the real table code paths at tiny scale so the drivers behind
Table 1 / Table 2 are exercised (and cross-checked) on every test run.
"""
import numpy as np
import pytest

from repro.bench.harness import (
    BenchResult,
    normalize_ratios,
    pick_seed_nodes,
    simple_benchmark,
)
from repro.bench.table1 import (
    PAPER_TABLE1,
    Table1Row,
    format_table1,
    run_table1,
    table1_graphs,
)
from repro.bench.table2 import (
    PAPER_TABLE2,
    estimate_ndlib_celf_seconds,
    format_table2,
    run_table2,
    table2_graph,
)
from repro.graphs.csr import build_csr
from repro.graphs.generators import erdos_renyi
from repro.graphs.weights import edge_weights


@pytest.fixture(scope="module")
def small_csr():
    return build_csr(erdos_renyi(120, 0.05, seed=6))


class TestPickSeedNodes:
    def test_deterministic_sorted_unique(self):
        a = pick_seed_nodes(100, 10)
        b = pick_seed_nodes(100, 10)
        assert np.array_equal(a, b)
        assert len(np.unique(a)) == 10
        assert (np.diff(a) > 0).all()

    def test_range(self):
        s = pick_seed_nodes(50, 50)
        assert sorted(s.tolist()) == list(range(50))


class TestSimpleBenchmark:
    def test_engines_agree_and_report(self, small_csr):
        w = edge_weights(small_csr, "WC")
        results = simple_benchmark(
            small_csr, w, n_seed_nodes=5, trials=10, engines=("csr", "pure_python")
        )
        assert [r.name for r in results] == ["csr", "pure_python"]
        assert all(r.trials == 10 for r in results)
        assert all(r.seconds > 0 and r.its_per_sec > 0 for r in results)
        spreads = {round(r.mean_spread, 9) for r in results}
        assert len(spreads) == 1

    def test_includes_ndlib(self, small_csr):
        w = edge_weights(small_csr, "TV")
        results = simple_benchmark(small_csr, w, n_seed_nodes=5, trials=5)
        assert [r.name for r in results] == ["csr", "pure_python", "ndlib_like"]

    def test_spark_engine_column(self, spark, small_csr):
        w = edge_weights(small_csr, "WC")
        results = simple_benchmark(
            small_csr, w, n_seed_nodes=5, trials=8, engines=("csr", "spark"), spark=spark
        )
        assert {r.name for r in results} == {"csr", "spark"}
        spreads = {round(r.mean_spread, 9) for r in results}
        assert len(spreads) == 1

    def test_spark_without_session_rejected(self, small_csr):
        w = edge_weights(small_csr, "WC")
        with pytest.raises(ValueError):
            simple_benchmark(small_csr, w, engines=("spark",), trials=2)


class TestNormalizeRatios:
    def test_fastest_is_one(self):
        rows = [
            BenchResult("a", 1, 2.0, 0.5, 1.0),
            BenchResult("b", 1, 20.0, 0.05, 1.0),
        ]
        r = normalize_ratios(rows)
        assert r == {"a": 1, "b": 10}

    def test_minimum_ratio_is_one(self):
        rows = [
            BenchResult("a", 1, 1.0, 1.0, 1.0),
            BenchResult("b", 1, 1.01, 1.0, 1.0),
        ]
        assert normalize_ratios(rows) == {"a": 1, "b": 1}


class TestTable1Driver:
    def test_paper_reference_complete(self):
        assert len(PAPER_TABLE1) == 9
        for ratios in PAPER_TABLE1.values():
            assert ratios["csr"] == 1

    def test_graphs_match_paper_scale(self):
        gs = table1_graphs()
        assert set(gs) == {"Erdős-Rényi", "Watts-Strogatz", "Facebook"}
        assert gs["Erdős-Rényi"].n == 2000
        assert gs["Watts-Strogatz"].n == 2000
        assert gs["Facebook"].n == 4039

    def test_rows_at_tiny_scale(self, small_csr):
        rows = run_table1(
            trials=3,
            engines=("csr", "pure_python"),
            graphs={"tiny": small_csr},
        )
        assert len(rows) == 3  # one per EWM
        for row in rows:
            assert isinstance(row, Table1Row)
            assert set(row.ratios) == {"csr", "pure_python"}
            assert min(row.ratios.values()) == 1

    def test_format_is_markdown(self, small_csr):
        rows = run_table1(trials=2, engines=("csr",), graphs={"tiny": small_csr})
        text = format_table1(rows)
        assert text.startswith("| Graph | EWM |")
        assert "tiny" in text


class TestTable2Driver:
    def test_paper_reference(self):
        assert PAPER_TABLE2[("WC", "pure_python")] == 153.0
        assert PAPER_TABLE2[("TV", "csr")] == 2.0

    def test_graph_is_seven_regular(self):
        g = table2_graph(100, 7, seed=1)
        assert (g.out_degree() == 7).all()

    def test_rows_at_tiny_scale(self):
        rows = run_table2(backends=("csr",), n=60, k=2, mc=10)
        assert len(rows) == 2  # TV and WC
        for row in rows:
            assert row.backend == "csr"
            assert row.seconds > 0
            assert len(row.seeds) == 2
            assert row.sigma_value >= 2
            assert row.n_evals >= 60

    def test_backends_pick_same_seeds(self):
        rows = run_table2(backends=("csr", "pure_python"), n=60, k=2, mc=10)
        by_ewm = {}
        for r in rows:
            by_ewm.setdefault(r.ewm, []).append(r)
        for ewm, cells in by_ewm.items():
            seeds = {tuple(c.seeds) for c in cells}
            assert len(seeds) == 1, f"backends disagree on {ewm}"

    def test_ndlib_extrapolation_positive(self):
        csr = table2_graph(60, 7, seed=1)
        w = edge_weights(csr, "TV", seed=0)
        est = estimate_ndlib_celf_seconds(csr, w, mc=5, sample_candidates=3)
        assert est > 0

    def test_format_is_markdown(self):
        rows = run_table2(backends=("csr",), n=60, k=2, mc=5)
        text = format_table2(rows)
        assert text.startswith("| EWM | backend |")
