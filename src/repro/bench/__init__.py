"""Benchmark harnesses (S15): simple_benchmark plus Table 1/2 drivers."""
from repro.bench.harness import BenchResult, normalize_ratios, simple_benchmark

__all__ = ["BenchResult", "simple_benchmark", "normalize_ratios"]
