"""Benchmark: reproduce Table 3 (model performance).

Regenerates (or loads from ``results/``) the training traces via the Spark
pipeline, trains the six models, and reports paper-vs-measured metrics.
One timed round — this measures the full table harness, not a microbench.
"""
import pytest

from repro.experiments import common
from repro.experiments.table3 import format_table3, run_table3


@pytest.mark.parametrize("benchmark_name", ["tpch", "tpcds"])
def test_table3(benchmark, spark, benchmark_name):
    res = benchmark.pedantic(
        lambda: run_table3(spark, benchmark_name), rounds=1, iterations=1)
    print()
    print(format_table3(res))
    for kind in ("subq", "qs", "lqp"):
        t = res["targets"][kind]
        assert t["latency"]["wmape"] < 0.5
        assert t["latency"]["corr"] > 0.8
        assert t["xput_k_per_s"] > 10
