"""Test fixtures: fake (analytic) model suites for fast algorithm tests and
a small real trained suite for integration tests.

The ``spark`` session fixture comes from the repo-root conftest.
"""
from __future__ import annotations

import json

import numpy as np
import pandas as pd
import pytest

from repro.model.gtn import EMB_DIM
from repro.model.predictor import ModelSuite, TargetModels


class FakeRegressor:
    """Duck-typed MLPRegressor: a fixed smooth function of the features.

    Gives the MOO algorithms a deterministic, well-behaved objective so
    algorithmic properties (Pareto optimality, aggregation equivalence,
    WUN) can be asserted exactly without training anything.
    """

    def __init__(self, kind: str, scale: float = 100.0, seed: int = 0):
        self.kind = kind
        self.scale = scale
        rng = np.random.default_rng(seed)
        self.w = rng.random(8) + 0.1  # positive weights over conf knobs

    def predict(self, X: np.ndarray) -> np.ndarray:
        X = np.atleast_2d(X)
        conf = X[:, EMB_DIM:EMB_DIM + 19]  # normalized knobs (subq/lqp layout)
        emb_mag = np.abs(X[:, :EMB_DIM]).mean(axis=1)
        cores = conf[:, 0] + conf[:, 2]  # k1, k3 normalized
        if self.kind == "latency":
            # more resources -> lower latency; θp matters mildly
            return self.scale * (0.2 + emb_mag) / (0.3 + cores) * (
                1.0 + 0.3 * np.abs(conf[:, 12] - 0.5))
        # io: driven by plan size and compression knob
        return self.scale * 10.0 * (0.2 + emb_mag) * (1.2 - 0.4 * conf[:, 6])


@pytest.fixture(scope="session")
def fake_suite() -> ModelSuite:
    return ModelSuite(
        subq=TargetModels(FakeRegressor("latency", 30.0), FakeRegressor("io", 30.0)),
        qs=TargetModels(FakeRegressor("latency", 30.0), FakeRegressor("io", 30.0)),
        lqp=TargetModels(FakeRegressor("latency", 300.0), FakeRegressor("io", 300.0)),
    )


@pytest.fixture(scope="session")
def tiny_traces() -> pd.DataFrame:
    """Small locally generated trace set (no Spark needed)."""
    from repro.model.traces import task_grid, trace_rows

    grid = task_grid("tpch", ["q1", "q3", "q6", "q9", "q12", "q14", "q18"],
                     3, 10, seed=3)
    rows: list[dict] = []
    for rec in grid.itertuples(index=False):
        rows.extend(trace_rows(rec.benchmark, rec.template, int(rec.variant),
                               json.loads(rec.conf_json), int(rec.conf_id)))
    return pd.DataFrame(rows)


@pytest.fixture(scope="session")
def small_suite(tiny_traces) -> ModelSuite:
    """A real (trained) suite on the tiny trace set — integration tests."""
    from repro.experiments.common import train_suite

    return train_suite(tiny_traces, epochs=30)
