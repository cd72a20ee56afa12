"""SOTA MOO baselines: Weighted Sum, Evolutionary (NSGA-II), Progressive
Frontier, and the fixed-weight single-objective method (SO-FW).

Each method solves Def. 3.3 over the *global* parameter space — either
query-level (one shared 19-knob vector: the prior-work control mode, e.g.
MO-WS = UDAO's weighted sum) or fine-grained (8 + 11·m dims), matching the
paper's Expt 6/7 configurations. All consume the same model-based
``CompileTimeObjectives`` evaluator that HMOOC uses, so comparisons
isolate the algorithm, not the models.
"""
from __future__ import annotations

import time

import numpy as np

from repro.moo.hmooc import MOOResult, QueryConfig, _lhs_unit
from repro.moo.objectives import D_C, D_PS, CompileTimeObjectives
from repro.moo.pareto import normalize, pareto_indices
from repro.params import C_IDS, P_IDS, S_IDS, from_vector


def _decode(obj: CompileTimeObjectives, U: np.ndarray, *, fine: bool) -> QueryConfig:
    """Turn a decision vector into a QueryConfig (shared or per-subQ θp/θs)."""
    if not fine:
        conf = from_vector(U, C_IDS + P_IDS + S_IDS)
        qc = QueryConfig(theta_c={k: conf[k] for k in C_IDS})
        for sq in obj.sq_ids:
            qc.theta_p[sq] = {k: conf[k] for k in P_IDS}
            qc.theta_s[sq] = {k: conf[k] for k in S_IDS}
        return qc
    qc = QueryConfig(theta_c=from_vector(U[:D_C], C_IDS))
    for j, sq in enumerate(obj.sq_ids):
        lo = D_C + j * D_PS
        ps = from_vector(U[lo:lo + D_PS], P_IDS + S_IDS)
        qc.theta_p[sq] = {k: ps[k] for k in P_IDS}
        qc.theta_s[sq] = {k: ps[k] for k in S_IDS}
    return qc


def _dims(obj: CompileTimeObjectives, fine: bool) -> int:
    return D_C + D_PS * obj.m if fine else D_C + D_PS


def _sample(obj: CompileTimeObjectives, n: int, fine: bool,
            rng: np.random.Generator) -> np.ndarray:
    """LHS candidates mapped into the refined per-knob search ranges."""
    from repro.params import refine_unit

    d = _dims(obj, fine)
    ids = C_IDS + (P_IDS + S_IDS) * (obj.m if fine else 1)
    return refine_unit(_lhs_unit(n, d, rng), ids)


def _evaluate(obj: CompileTimeObjectives, U: np.ndarray, fine: bool) -> np.ndarray:
    return obj.query_fine_batch(U) if fine else obj.query_shared_batch(U)


def weighted_sum(obj: CompileTimeObjectives, *, n_samples: int = 10_000,
                 n_weights: int = 11, fine: bool = False, seed: int = 0) -> MOOResult:
    """Classic WS [29]: evenly spaced weight vectors over one big sample set.

    Known failure mode the paper demonstrates (Fig. 4): many weight vectors
    collapse to the same solution, giving poor Pareto coverage.
    """
    t0 = time.perf_counter()
    rng = np.random.default_rng(seed)
    U = _sample(obj, n_samples, fine, rng)
    F = _evaluate(obj, U, fine)
    Fn, _, _ = normalize(F)
    picks = sorted({int((Fn * np.array([w, 1 - w])).sum(axis=1).argmin())
                    for w in np.linspace(0, 1, n_weights)})
    Fp = F[picks]
    keep = pareto_indices(Fp)
    return MOOResult(
        F=Fp[keep],
        configs=[_decode(obj, U[picks[i]], fine=fine) for i in keep],
        solving_time_s=time.perf_counter() - t0,
        method=f"ws-{'fine' if fine else 'query'}",
    )


# ---------------------------------------------------------------------------
# NSGA-II (Evo [7])
# ---------------------------------------------------------------------------

def _fast_nondominated_rank(F: np.ndarray) -> np.ndarray:
    n = len(F)
    rank = np.zeros(n, dtype=int)
    remaining = np.arange(n)
    r = 0
    while len(remaining):
        sub = F[remaining]
        front = remaining[pareto_indices(sub)]
        rank[front] = r
        remaining = np.setdiff1d(remaining, front)
        r += 1
    return rank


def _crowding(F: np.ndarray) -> np.ndarray:
    n = len(F)
    if n <= 2:
        return np.full(n, np.inf)
    dist = np.zeros(n)
    for j in range(F.shape[1]):
        order = np.argsort(F[:, j])
        span = F[order[-1], j] - F[order[0], j] or 1.0
        dist[order[0]] = dist[order[-1]] = np.inf
        dist[order[1:-1]] += (F[order[2:], j] - F[order[:-2], j]) / span
    return dist


def evo(obj: CompileTimeObjectives, *, pop: int = 100, n_evals: int = 500,
        fine: bool = False, seed: int = 0) -> MOOResult:
    """NSGA-II with SBX crossover and polynomial mutation in [0,1]^d."""
    t0 = time.perf_counter()
    rng = np.random.default_rng(seed)
    d = _dims(obj, fine)
    P = _sample(obj, pop, fine, rng)
    FP = _evaluate(obj, P, fine)
    evals = pop
    eta_c, eta_m = 10.0, 20.0
    while evals < n_evals:
        rank = _fast_nondominated_rank(FP)
        # binary tournament by (rank, crowding)
        crowd = np.zeros(len(P))
        for r in np.unique(rank):
            mask = rank == r
            crowd[mask] = _crowding(FP[mask])
        cand = rng.integers(0, len(P), (pop, 2))
        better = np.where(
            (rank[cand[:, 0]] < rank[cand[:, 1]])
            | ((rank[cand[:, 0]] == rank[cand[:, 1]])
               & (crowd[cand[:, 0]] >= crowd[cand[:, 1]])),
            cand[:, 0], cand[:, 1])
        parents = P[better]
        # SBX
        kids = parents.copy()
        for i in range(0, pop - 1, 2):
            u = rng.random(d)
            beta = np.where(u <= 0.5, (2 * u) ** (1 / (eta_c + 1)),
                            (1 / (2 * (1 - u))) ** (1 / (eta_c + 1)))
            a, b = parents[i], parents[i + 1]
            kids[i] = 0.5 * ((1 + beta) * a + (1 - beta) * b)
            kids[i + 1] = 0.5 * ((1 - beta) * a + (1 + beta) * b)
        # polynomial mutation
        mut = rng.random(kids.shape) < (1.0 / d)
        u = rng.random(kids.shape)
        delta = np.where(u < 0.5, (2 * u) ** (1 / (eta_m + 1)) - 1,
                         1 - (2 * (1 - u)) ** (1 / (eta_m + 1)))
        kids = np.clip(kids + mut * delta, 0.0, 1.0)
        FK = _evaluate(obj, kids, fine)
        evals += pop
        # environmental selection
        allP = np.concatenate([P, kids])
        allF = np.concatenate([FP, FK])
        rank = _fast_nondominated_rank(allF)
        order = []
        for r in np.unique(rank):
            idx = np.flatnonzero(rank == r)
            idx = idx[np.argsort(-_crowding(allF[idx]))]
            order.extend(idx.tolist())
            if len(order) >= pop:
                break
        sel = np.array(order[:pop])
        P, FP = allP[sel], allF[sel]
    keep = pareto_indices(FP)
    return MOOResult(F=FP[keep],
                     configs=[_decode(obj, P[i], fine=fine) for i in keep],
                     solving_time_s=time.perf_counter() - t0,
                     method=f"evo-{'fine' if fine else 'query'}")


def progressive_frontier(obj: CompileTimeObjectives, *, n_probes: int = 2048,
                         n_points: int = 11, fine: bool = False,
                         seed: int = 0) -> MOOResult:
    """Progressive Frontier [40]: extreme points, then repeated
    middle-point constrained solves (ε-constraint via filtered sampling)."""
    t0 = time.perf_counter()
    rng = np.random.default_rng(seed)
    U = _sample(obj, n_probes, fine, rng)
    F = _evaluate(obj, U, fine)
    sols: dict[int, np.ndarray] = {}
    for j in range(2):
        sols[int(F[:, j].argmin())] = F[F[:, j].argmin()]
    rects = [(min(sols, key=lambda i: F[i, 0]), min(sols, key=lambda i: F[i, 1]))]
    while len(sols) < n_points and rects:
        # pick the widest rectangle (by normalized volume)
        spans = []
        lo_all, hi_all = F.min(axis=0), F.max(axis=0)
        rng_span = np.where(hi_all > lo_all, hi_all - lo_all, 1.0)
        for a, b in rects:
            spans.append(abs((F[a, 0] - F[b, 0]) * (F[a, 1] - F[b, 1])) / (rng_span[0] * rng_span[1]))
        k = int(np.argmax(spans))
        a, b = rects.pop(k)
        mid1 = 0.5 * (F[a, 1] + F[b, 1])
        # constrained solve: min f0 s.t. f1 <= mid1
        mask = F[:, 1] <= mid1
        if not mask.any():
            continue
        i_new = int(np.flatnonzero(mask)[F[mask, 0].argmin()])
        if i_new in sols:
            continue
        sols[i_new] = F[i_new]
        rects.append((a, i_new))
        rects.append((i_new, b))
    idx = np.array(sorted(sols))
    keep = pareto_indices(F[idx])
    final = idx[keep]
    return MOOResult(F=F[final],
                     configs=[_decode(obj, U[i], fine=fine) for i in final],
                     solving_time_s=time.perf_counter() - t0,
                     method=f"pf-{'fine' if fine else 'query'}")


def so_fixed_weights(obj: CompileTimeObjectives, weights, *, n_samples: int = 4096,
                     seed: int = 0) -> tuple[QueryConfig, np.ndarray, float]:
    """SO-FW [21, 59, 66]: collapse objectives with fixed weights and return
    the single optimum — the theoretically unsound baseline of Expt 10.

    Query-level control; normalization is the sampled min-max, as in prior
    work. Returns (config, predicted F, solving time).
    """
    t0 = time.perf_counter()
    rng = np.random.default_rng(seed)
    U = _sample(obj, n_samples, False, rng)
    F = _evaluate(obj, U, fine=False)
    Fn, _, _ = normalize(F)
    w = np.asarray(weights, dtype=np.float64)
    i = int((Fn * w).sum(axis=1).argmin())
    return (_decode(obj, U[i], fine=False), F[i], time.perf_counter() - t0)
