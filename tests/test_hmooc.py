"""Unit tests for HMOOC: effective-set generation, DAG aggregation
(HMOOC1/2/3) and the end-to-end pipeline — including the paper's formal
properties (Prop. 5.1–5.3, Appendix B)."""
import numpy as np
import pytest

from repro.core.plan import partition_subqs
from repro.core.workloads import build_query
from repro.moo import hmooc as H
from repro.moo.objectives import CompileTimeObjectives
from repro.moo.pareto import dominates, pareto_indices


def _sols(rng, n, m):
    """Random per-subQ solution lists [(F, ids)] for aggregation tests."""
    out = []
    for i in range(m):
        F = rng.random((n, 2)) * 10
        out.append((F, [[j] for j in range(n)]))
    return out


def brute_force_query_front(sq_sols):
    """Enumerate every combination (exponential — small cases only)."""
    import itertools
    Fs = [s[0] for s in sq_sols]
    combos = list(itertools.product(*[range(len(F)) for F in Fs]))
    F_all = np.array([sum(F[c] for F, c in zip(Fs, combo)) for combo in combos])
    keep = pareto_indices(F_all)
    return {tuple(np.round(F_all[i], 9)) for i in keep}


@pytest.mark.parametrize("seed", range(5))
def test_hmooc1_exact_vs_brute_force(seed):
    """Prop. B.1: divide-and-conquer returns the full query-level front."""
    rng = np.random.default_rng(seed)
    sq_sols = _sols(rng, 6, 4)
    F, combos = H.aggregate_dnc(sq_sols)
    got = {tuple(np.round(f, 9)) for f in F}
    assert got == brute_force_query_front(sq_sols)


def test_hmooc1_combo_bookkeeping():
    rng = np.random.default_rng(11)
    sq_sols = _sols(rng, 4, 3)
    F, combos = H.aggregate_dnc(sq_sols)
    for f, combo in zip(F, combos):
        assert len(combo) == 3
        rebuilt = sum(sq_sols[i][0][combo[i]] for i in range(3))
        np.testing.assert_allclose(f, rebuilt)


@pytest.mark.parametrize("seed", range(5))
def test_hmooc2_subset_of_front(seed):
    """Lemma 1: WS aggregation returns a non-empty subset of the exact front."""
    rng = np.random.default_rng(seed + 50)
    sq_sols = _sols(rng, 5, 3)
    F_exact, _ = H.aggregate_dnc(sq_sols)
    exact = {tuple(np.round(f, 9)) for f in F_exact}
    F_ws, _ = H.aggregate_ws(sq_sols, n_weights=11)
    assert len(F_ws) >= 1
    # WS with per-subQ normalization may construct points that are not
    # globally Pareto-optimal; the Pareto subset of its output must be
    # contained in the exact front for the extreme weights (w=0, w=1).
    got = {tuple(np.round(f, 9)) for f in F_ws}
    # at minimum, the two per-objective optima are shared
    best0 = min(exact, key=lambda t: t[0])
    best1 = min(exact, key=lambda t: t[1])
    assert best0 in got and best1 in got


@pytest.mark.parametrize("seed", range(5))
def test_hmooc3_extreme_points(seed):
    """Prop. 5.2/5.3: the two extreme points bound the front and are
    query-level Pareto optimal under a fixed θc."""
    rng = np.random.default_rng(seed + 99)
    sq_sols = _sols(rng, 5, 3)
    F_b, combos = H.aggregate_boundary(sq_sols)
    assert F_b.shape == (2, 2)  # k = 2 objectives -> 2 extreme points
    F_exact, _ = H.aggregate_dnc(sq_sols)
    # extreme points achieve the per-objective minima of the exact front
    assert F_b[0, 0] == pytest.approx(F_exact[:, 0].min())
    assert F_b[1, 1] == pytest.approx(F_exact[:, 1].min())
    # and the whole exact front lies inside the rectangle they span
    assert np.all(F_exact[:, 0] >= F_b[0, 0] - 1e-9)
    assert np.all(F_exact[:, 1] >= F_b[1, 1] - 1e-9)


def test_prop51_only_local_pareto_contributes():
    """Prop. 5.1: under a fixed θc, dominated subQ solutions never appear
    in query-level Pareto solutions."""
    rng = np.random.default_rng(7)
    sq_sols = _sols(rng, 6, 3)
    F, combos = H.aggregate_dnc(sq_sols)
    for combo in combos:
        for i, j in enumerate(combo):
            F_i = sq_sols[i][0]
            assert not any(dominates(F_i[k], F_i[j]) for k in range(len(F_i))), \
                "a dominated subQ-level solution reached the query-level front"


def test_kmeans_basic():
    rng = np.random.default_rng(0)
    U = np.concatenate([rng.normal(0.2, 0.02, (20, 3)),
                        rng.normal(0.8, 0.02, (20, 3))])
    labels, reps, centers = H._kmeans(U, 2, seed=1)
    assert len(set(labels[:20])) == 1 and len(set(labels[20:])) == 1
    assert labels[0] != labels[-1]
    assert len(reps) == 2


def test_kmeans_k_larger_than_n():
    U = np.random.default_rng(0).random((3, 2))
    labels, reps, centers = H._kmeans(U, 10, seed=0)
    assert len(reps) <= 3


def test_crossover_enrich_preserves_domain():
    rng = np.random.default_rng(1)
    Uc = rng.random((10, 8))
    new = H._crossover_enrich(Uc, 6, seed=2)
    assert new.shape == (6, 8)
    # every coordinate of a child comes from a parent
    for row in new:
        assert all(any(abs(v - Uc[p, j]) < 1e-12 for p in range(10))
                   for j, v in enumerate(row))


def test_lhs_unit_stratified():
    rng = np.random.default_rng(3)
    U = H._lhs_unit(16, 4, rng)
    assert U.shape == (16, 4)
    assert np.all((U >= 0) & (U <= 1))
    for j in range(4):
        assert U[:, j].min() < 0.2 and U[:, j].max() > 0.8


@pytest.fixture(scope="module")
def obj(fake_suite):
    dag = partition_subqs(build_query("tpch", "q3", sf=10.0))
    return CompileTimeObjectives(dag, fake_suite)


def test_effective_set_structure(obj):
    eff = H.generate_effective_set(obj, n_c=12, n_clusters=3, n_p=16, seed=0)
    assert eff.Uc.shape[1] == 8
    assert len(eff.Uc) == 12 + 6  # crossover enrichment adds n_c // 2
    for sq in obj.sq_ids:
        assert len(eff.sols[sq]) == len(eff.Uc)
        for pidx, F in eff.sols[sq]:
            assert len(pidx) == len(F)
            assert len(pidx) >= 1
            # stored solutions are the local Pareto set of the pool
            assert np.all(F > 0)


def test_effective_set_no_enrich(obj):
    eff = H.generate_effective_set(obj, n_c=8, n_clusters=2, n_p=8,
                                   enrich=False, seed=0)
    assert len(eff.Uc) == 8


@pytest.mark.parametrize("agg", ["boundary", "ws", "dnc"])
def test_hmooc_end_to_end(obj, fake_suite, agg):
    res = H.hmooc(obj.dag, fake_suite, agg=agg, n_c=12, n_clusters=3, n_p=16,
                  seed=0, objectives=obj)
    assert len(res.F) >= 1
    assert len(res.configs) == len(res.F)
    # returned set is mutually non-dominated
    assert len(pareto_indices(res.F)) == len(res.F)
    assert res.solving_time_s > 0
    # configs well-formed: θc query-level + per-subQ θp/θs
    qc = res.configs[0]
    assert set(qc.theta_p) == set(obj.sq_ids)
    assert set(qc.theta_c) == {"k1", "k2", "k3", "k4", "k5", "k6", "k7", "k8"}


def test_hmooc_recommend_weights(obj, fake_suite):
    res = H.hmooc(obj.dag, fake_suite, agg="boundary", n_c=12, n_clusters=3,
                  n_p=16, seed=0, objectives=obj)
    F_lat, _ = res.recommend((0.99, 0.01))
    F_cost, _ = res.recommend((0.01, 0.99))
    assert F_lat[0] <= F_cost[0]  # latency preference picks faster point
    assert F_cost[1] <= F_lat[1]


def test_hmooc_dnc_front_dominates_boundary(obj, fake_suite):
    """HMOOC1 is exact per θc; HMOOC3 is its 2-point approximation, so the
    dnc front's hypervolume is at least boundary's."""
    from repro.moo.pareto import hypervolume_2d, normalize
    r_d = H.hmooc(obj.dag, fake_suite, agg="dnc", n_c=10, n_clusters=3,
                  n_p=12, seed=1, objectives=obj)
    r_b = H.hmooc(obj.dag, fake_suite, agg="boundary", n_c=10, n_clusters=3,
                  n_p=12, seed=1, objectives=obj)
    allF = np.concatenate([r_d.F, r_b.F])
    _, lo, hi = normalize(allF)
    ref = np.array([1.1, 1.1])
    hv_d = hypervolume_2d(normalize(r_d.F, lo, hi)[0], ref)
    hv_b = hypervolume_2d(normalize(r_b.F, lo, hi)[0], ref)
    assert hv_d >= hv_b - 1e-9
