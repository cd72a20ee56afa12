"""HMOOC: Hierarchical Multi-Objective Optimization with Constraints (§5.1).

Compile-time fine-grained tuning as a divide-and-conquer over subQs under
the constraint that every subQ shares the same θc:

1. **Effective-set generation** (Algorithm 1) — LHS-initialize θc
   candidates, cluster them (k-means), solve the θp⊗θs MOO per cluster
   representative per subQ over a shared sample pool, assign each member
   its representative's optimal θp set, then *enrich* θc by the crossover
   (Cartesian-product) heuristic of Appendix C.1 and re-assign.
2. **DAG aggregation** — recover query-level Pareto solutions from
   subQ-level ones under each θc: HMOOC1 divide-and-conquer merge (exact),
   HMOOC2 weighted-sum approximation (subset of the Pareto set), HMOOC3
   boundary approximation (k extreme points per θc; the shipped default).
3. **WUN recommendation** — pick the Pareto point nearest the Utopia
   point under the user's preference weights.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from repro.moo.objectives import D_C, D_PS, CompileTimeObjectives
from repro.moo.pareto import pareto_indices, wun_select
from repro.params import C_IDS, P_IDS, S_IDS, from_vector


@dataclass
class QueryConfig:
    """A full fine-grained configuration: θc + per-subQ θp/θs."""

    theta_c: dict
    theta_p: dict[int, dict] = field(default_factory=dict)  # sq_id -> θp
    theta_s: dict[int, dict] = field(default_factory=dict)  # sq_id -> θs


@dataclass
class MOOResult:
    """A Pareto set in objective space plus the matching configurations."""

    F: np.ndarray                 # (n, 2) [latency, cost]
    configs: list[QueryConfig]
    solving_time_s: float
    method: str

    def recommend(self, weights) -> tuple[np.ndarray, QueryConfig]:
        i = wun_select(self.F, np.asarray(weights))
        return self.F[i], self.configs[i]


def _kmeans(U: np.ndarray, k: int, *, iters: int = 20, seed: int = 0):
    """Tiny k-means over normalized θc vectors; returns (labels, rep_idx)."""
    rng = np.random.default_rng(seed)
    k = min(k, len(U))
    centers = U[rng.choice(len(U), k, replace=False)]
    labels = np.zeros(len(U), dtype=int)
    for _ in range(iters):
        d = ((U[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)
        new_labels = d.argmin(axis=1)
        if np.array_equal(new_labels, labels):
            labels = new_labels
            break
        labels = new_labels
        for j in range(k):
            mask = labels == j
            if mask.any():
                centers[j] = U[mask].mean(axis=0)
    # representative = member nearest its centroid
    d = ((U[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)
    rep_idx = np.array([
        np.flatnonzero(labels == j)[d[labels == j, j].argmin()]
        if (labels == j).any() else 0
        for j in range(k)])
    return labels, rep_idx, centers


def _assign_cluster(U_new: np.ndarray, centers: np.ndarray) -> np.ndarray:
    d = ((U_new[:, None, :] - centers[None, :, :]) ** 2).sum(axis=2)
    return d.argmin(axis=1)


def _crossover_enrich(Uc: np.ndarray, n_new: int, seed: int) -> np.ndarray:
    """Appendix C.1 θc crossover: split two parents at a random knob
    boundary and take the Cartesian product of the halves."""
    rng = np.random.default_rng(seed)
    out = []
    while len(out) < n_new:
        i, j = rng.choice(len(Uc), 2, replace=False)
        cut = rng.integers(1, Uc.shape[1])
        out.append(np.concatenate([Uc[i, :cut], Uc[j, cut:]]))
        out.append(np.concatenate([Uc[j, :cut], Uc[i, cut:]]))
    return np.array(out[:n_new])


@dataclass
class _EffectiveSet:
    """Per-subQ solutions grouped by θc candidate."""

    Uc: np.ndarray                       # (n_c, 8) θc candidates (normalized)
    pool: np.ndarray                     # (n_p, 11) shared θp⊗θs pool
    # sols[sq_id][cand_idx] = (pool_indices, F (len, 2))
    sols: dict[int, list[tuple[np.ndarray, np.ndarray]]]


def _lhs_unit(n: int, d: int, rng: np.random.Generator) -> np.ndarray:
    return (rng.permuted(np.tile(np.arange(n), (d, 1)), axis=1).T
            + rng.random((n, d))) / n


def generate_effective_set(obj: CompileTimeObjectives, *, n_c: int = 128,
                           n_clusters: int = 14, n_p: int = 256,
                           enrich: bool = True, seed: int = 0) -> _EffectiveSet:
    """Algorithm 1: effective per-subQ solution sets under shared θc."""
    from repro.params import refine_unit
    rng = np.random.default_rng(seed)
    Uc = refine_unit(_lhs_unit(n_c, D_C, rng), C_IDS)
    labels, rep_idx, centers = _kmeans(Uc, n_clusters, seed=seed)
    pool = refine_unit(_lhs_unit(n_p, D_PS, rng), P_IDS + S_IDS)

    # optimize_p_moo: local Pareto θp⊗θs per (representative, subQ)
    opt_idx: dict[tuple[int, int], np.ndarray] = {}
    for g, r in enumerate(rep_idx):
        U_full = np.concatenate([np.tile(Uc[r], (n_p, 1)), pool], axis=1)
        for sq in obj.sq_ids:
            F = obj.subq_batch(sq, U_full)
            opt_idx[(g, sq)] = pareto_indices(F)

    def assign(U_cands: np.ndarray, cand_labels: np.ndarray):
        # One batched model call per (cluster, subQ): every member of the
        # cluster is evaluated with the representative's optimal θp set.
        out: dict[int, list] = {sq: [None] * len(U_cands) for sq in obj.sq_ids}
        for g in range(len(rep_idx)):
            members = np.flatnonzero(cand_labels == g)
            if len(members) == 0:
                continue
            for sq in obj.sq_ids:
                pidx = opt_idx[(g, sq)]
                np_g = len(pidx)
                U_full = np.concatenate(
                    [np.repeat(U_cands[members], np_g, axis=0),
                     np.tile(pool[pidx], (len(members), 1))], axis=1)
                F = obj.subq_batch(sq, U_full)
                for mi, ci in enumerate(members):
                    out[sq][ci] = (pidx, F[mi * np_g:(mi + 1) * np_g])
        return out

    sols = assign(Uc, labels)
    if enrich and len(Uc) >= 2:
        U_new = _crossover_enrich(Uc, n_c // 2, seed + 1)
        new_labels = _assign_cluster(U_new, centers)
        new_sols = assign(U_new, new_labels)
        for sq in obj.sq_ids:
            sols[sq].extend(new_sols[sq])
        Uc = np.concatenate([Uc, U_new], axis=0)
    return _EffectiveSet(Uc=Uc, pool=pool, sols=sols)


# ---------------------------------------------------------------------------
# DAG aggregation (§5.1.2)
# ---------------------------------------------------------------------------

def _merge_two(FA: np.ndarray, IA: list, FB: np.ndarray, IB: list, cap: int = 512):
    """HMOOC1 merge: Minkowski sum of two solution lists, Pareto-filtered."""
    F = (FA[:, None, :] + FB[None, :, :]).reshape(-1, 2)
    idx = pareto_indices(F)
    if len(idx) > cap:
        idx = idx[np.linspace(0, len(idx) - 1, cap).astype(int)]
    nb = len(FB)
    combos = [IA[i // nb] + IB[i % nb] for i in idx]
    return F[idx], combos


def aggregate_dnc(sq_sols: list[tuple[np.ndarray, list]]):
    """HMOOC1: divide-and-conquer exact DAG aggregation for one θc."""
    if len(sq_sols) == 1:
        F, I = sq_sols[0]
        idx = pareto_indices(F)
        return F[idx], [I[i] for i in idx]
    mid = len(sq_sols) // 2
    FA, IA = aggregate_dnc(sq_sols[:mid])
    FB, IB = aggregate_dnc(sq_sols[mid:])
    return _merge_two(FA, IA, FB, IB)


def aggregate_ws(sq_sols: list[tuple[np.ndarray, list]], n_weights: int = 11):
    """HMOOC2: weighted-sum aggregation (Algorithm 4) for one θc."""
    ws = np.linspace(0.0, 1.0, n_weights)
    F_out, I_out = [], []
    for w in ws:
        wv = np.array([w, 1.0 - w])
        total = np.zeros(2)
        combo: list = []
        for F, I in sq_sols:
            lo, hi = F.min(axis=0), F.max(axis=0)
            Fn = (F - lo) / np.where(hi > lo, hi - lo, 1.0)
            j = int((Fn * wv).sum(axis=1).argmin())
            total = total + F[j]
            combo = combo + I[j]
        F_out.append(total)
        I_out.append(combo)
    F_out = np.array(F_out)
    idx = pareto_indices(F_out)
    return F_out[idx], [I_out[i] for i in idx]


def aggregate_boundary(sq_sols: list[tuple[np.ndarray, list]]):
    """HMOOC3: the k extreme points (best-latency, best-cost) for one θc."""
    out_F, out_I = [], []
    for obj_i in range(2):
        total = np.zeros(2)
        combo: list = []
        for F, I in sq_sols:
            j = int(F[:, obj_i].argmin())
            total = total + F[j]
            combo = combo + I[j]
        out_F.append(total)
        out_I.append(combo)
    return np.array(out_F), out_I


_AGGREGATORS = {"dnc": aggregate_dnc, "ws": aggregate_ws, "boundary": aggregate_boundary}


def hmooc(dag, suite, *, agg: str = "boundary", n_c: int = 128, n_clusters: int = 14,
          n_p: int = 256, enrich: bool = True, seed: int = 0,
          objectives: CompileTimeObjectives | None = None) -> MOOResult:
    """Full compile-time HMOOC pipeline; ``agg`` picks HMOOC1/2/3."""
    t0 = time.perf_counter()
    obj = objectives or CompileTimeObjectives(dag, suite)
    eff = generate_effective_set(obj, n_c=n_c, n_clusters=n_clusters, n_p=n_p,
                                 enrich=enrich, seed=seed)
    aggregate = _AGGREGATORS[agg]

    all_F: list[np.ndarray] = []
    all_cfg: list[tuple[int, list[int]]] = []  # (θc cand index, per-subQ pool idx)
    n_cands = len(eff.Uc)
    for ci in range(n_cands):
        sq_sols = []
        for sq in obj.sq_ids:
            pidx, F = eff.sols[sq][ci]
            sq_sols.append((F, [[int(j)] for j in pidx]))
        F_c, combos = aggregate(sq_sols)
        all_F.append(F_c)
        all_cfg.extend((ci, combo) for combo in combos)
    F = np.concatenate(all_F, axis=0)
    keep = pareto_indices(F)

    configs = []
    for i in keep:
        ci, combo = all_cfg[i]
        qc = QueryConfig(theta_c=from_vector(eff.Uc[ci], C_IDS))
        for j, sq in enumerate(obj.sq_ids):
            ps = from_vector(eff.pool[combo[j]], P_IDS + S_IDS)
            qc.theta_p[sq] = {k: ps[k] for k in P_IDS}
            qc.theta_s[sq] = {k: ps[k] for k in S_IDS}
        configs.append(qc)
    return MOOResult(F=F[keep], configs=configs,
                     solving_time_s=time.perf_counter() - t0, method=f"hmooc-{agg}")
