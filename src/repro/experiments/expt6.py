"""Expt 6 reproduction (Fig. 10c–e, reported in the paper's prose):
compile-time MOO quality — hypervolume and solving time of HMOOC3 vs the
SOTA methods WS, Evo and PF for fine-grained tuning (Def. 3.3), plus the
query-level variants of Expt 7.

Hypervolume is computed per query in the *model-predicted* objective space
(as in the paper), normalized by the union of all methods' solutions with
reference point (1.1, 1.1); higher is better.
"""
from __future__ import annotations

import numpy as np

from repro.core.plan import partition_subqs
from repro.core.workloads import benchmark_queries, build_query
from repro.experiments import common
from repro.model.predictor import ModelSuite
from repro.moo.baselines import evo, progressive_frontier, weighted_sum
from repro.moo.hmooc import hmooc
from repro.moo.objectives import CompileTimeObjectives
from repro.moo.pareto import hypervolume_2d, normalize

PAPER_EXPT6 = {
    # average HV (%) and solving time (s) read off Fig. 10(c)-(e) + prose:
    # HMOOC3 93.4% @0.5-0.55s (TPCH), 89.9% @0.55s (TPCDS); others 7.9-81.7%
    # lower HV and 81.8-98.3% more solving time.
    "tpch": {"hmooc3": (93.4, 0.52), "ws": (81.6, 2.9), "evo": (80.0, 5.0),
             "pf": (75.0, 15.0)},
    "tpcds": {"hmooc3": (89.9, 0.55), "ws": (83.3, 15.0), "evo": (80.0, 12.0),
              "pf": (70.0, 30.0)},
}


def run_expt6(benchmark: str, suite: ModelSuite, *, sf: float = 100.0,
              seed: int = 0, queries: list[str] | None = None,
              include_query_level: bool = True) -> dict:
    queries = queries or benchmark_queries(benchmark)
    methods: dict[str, dict] = {}
    per_q: dict[str, dict] = {}
    for q in queries:
        dag = partition_subqs(build_query(benchmark, q, sf=sf))
        obj = CompileTimeObjectives(dag, suite)
        # Rival budgets follow the paper's documented settings (§6.2): WS
        # with 10k samples × 11 weights, Evo with population 100 and 500
        # function evaluations, PF with its sampling-based inner solver.
        # Our vectorized numpy rivals are much faster *per evaluation*
        # than the paper's GPU-server loop, so absolute solving times are
        # smaller across the board; the HV ordering is the claim.
        runs = {
            "hmooc3": hmooc(dag, suite, agg="boundary", seed=seed, objectives=obj),
            "ws-fine": weighted_sum(obj, fine=True, seed=seed),
            "evo-fine": evo(obj, fine=True, seed=seed),
            "pf-fine": progressive_frontier(obj, fine=True, seed=seed),
        }
        if include_query_level:
            runs["ws-query"] = weighted_sum(obj, fine=False, seed=seed)
            runs["evo-query"] = evo(obj, fine=False, seed=seed)
            runs["pf-query"] = progressive_frontier(obj, fine=False, seed=seed)
        # common normalization across methods for a fair HV
        all_F = np.concatenate([r.F for r in runs.values()])
        lo, hi = all_F.min(axis=0), all_F.max(axis=0)
        ref = np.array([1.1, 1.1])
        per_q[q] = {}
        for name, r in runs.items():
            Fn, _, _ = normalize(r.F, lo, hi)
            hv = hypervolume_2d(Fn, ref) / (ref[0] * ref[1])
            per_q[q][name] = dict(hv=hv, solve=r.solving_time_s, n_points=len(r.F))
    for name in next(iter(per_q.values())):
        methods[name] = dict(
            hv=float(np.mean([per_q[q][name]["hv"] for q in per_q])),
            avg_solve=float(np.mean([per_q[q][name]["solve"] for q in per_q])),
            max_solve=float(np.max([per_q[q][name]["solve"] for q in per_q])),
        )
    out = dict(benchmark=benchmark, methods=methods, per_query=per_q)
    common.save_json(out, f"expt6_{benchmark}.json")
    return out


def format_expt6(results: dict) -> str:
    bm = results["benchmark"]
    lines = [f"Expt 6/7 — {bm.upper()}: avg hypervolume and solving time",
             f"{'method':12s} {'HV':>8s} {'avg solve (s)':>14s} {'max solve (s)':>14s}"]
    for name, m in sorted(results["methods"].items()):
        lines.append(f"{name:12s} {m['hv']:8.1%} {m['avg_solve']:14.2f} {m['max_solve']:14.2f}")
    p = PAPER_EXPT6[bm]
    lines.append(f"paper: HMOOC3 HV {p['hmooc3'][0]:.1f}% @ {p['hmooc3'][1]:.2f}s; "
                 "best alternative ≤ "
                 f"{max(v[0] for k, v in p.items() if k != 'hmooc3'):.1f}% HV "
                 "with ≥ 4x solving time")
    return "\n".join(lines)
