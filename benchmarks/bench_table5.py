"""Benchmark: reproduce Table 5 (adapting to latency/cost preferences).

Sweeps the five preference vectors for SO-FW and HMOOC3+ and prints the
paper-vs-measured Δlatency/Δcost table. Asserts the shape results R4/R5:
HMOOC3+ dominates SO-FW and adapts monotonically to the preference.
"""
import pytest

from repro.experiments import common
from repro.experiments.table5 import PREFS, format_table5, run_table5


@pytest.mark.parametrize("benchmark_name", ["tpch", "tpcds"])
def test_table5(benchmark, spark, benchmark_name):
    suite = common.get_suite(spark, benchmark_name)
    res = benchmark.pedantic(
        lambda: run_table5(benchmark_name, suite), rounds=1, iterations=1)
    print()
    print(format_table5(res))
    rows = [res["prefs"][f"{p[0]:.1f},{p[1]:.1f}"] for p in PREFS]
    # R5: HMOOC3+ latency reduction grows as preference shifts to speed
    h_lat = [r["hmooc3+"][0] for r in rows]
    assert h_lat[-1] < h_lat[0] + 0.02  # (1,0) at least as fast as (0,1)
    # cost-preferring corner actually saves cost vs the speed corner
    h_cost = [r["hmooc3+"][1] for r in rows]
    assert h_cost[0] < h_cost[-1] + 0.02
    # R4: with the strong speed preference, HMOOC3+ cuts latency far more
    # than SO-FW
    assert rows[3]["hmooc3+"][0] < rows[3]["so-fw"][0] + 0.05
