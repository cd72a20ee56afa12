"""Benchmark: θp tuning on the *live* Spark session (grounding check).

Times TPC-H-lite Q3 at SF=0.1 under the default θp versus a tuned θp that
enables broadcast joins and right-sizes shuffle partitions — the real-
Catalyst counterpart of the simulator's join-algorithm effect (Fig. 3).
"""
import pytest

from repro.params import MB, default_conf
from repro.sparkexec.queries import LITE_QUERIES, load_tables
from repro.sparkexec.runner import join_algorithms, run_with_conf

SF = 0.1


@pytest.fixture(scope="module")
def q3_tables(spark):
    return load_tables(spark, LITE_QUERIES["q3"].tables, sf=SF)


def _run(spark, tables, conf):
    return run_with_conf(spark, LITE_QUERIES["q3"].build, tables, conf)


def test_live_q3_default_theta_p(benchmark, spark, q3_tables):
    conf = dict(default_conf(), s4=1.0, s3=1.0)  # broadcast disabled
    res = benchmark.pedantic(lambda: _run(spark, q3_tables, conf),
                             rounds=2, iterations=1, warmup_rounds=1)
    assert join_algorithms(res.plan)["BHJ"] == 0


def test_live_q3_tuned_theta_p(benchmark, spark, q3_tables):
    conf = dict(default_conf(), s4=128 * MB, s1=32 * MB)
    res = benchmark.pedantic(lambda: _run(spark, q3_tables, conf),
                             rounds=2, iterations=1, warmup_rounds=1)
    assert join_algorithms(res.plan)["BHJ"] >= 1
