"""Pareto-set utilities: dominance filtering, hypervolume, WUN selection.

All objectives are *minimized*. Objective matrices are ``(n, k)`` numpy
arrays; helpers return index arrays into the input so callers can carry
configurations alongside.
"""
from __future__ import annotations

import numpy as np


def pareto_indices(F: np.ndarray) -> np.ndarray:
    """Indices of non-dominated rows of ``F`` (minimization).

    Uses the classic sort-then-sweep for k=2 — O(n log n), the [18]
    Kung-Luccio-Preparata bound the paper cites — and a vectorized
    pairwise check for k>2.
    """
    F = np.asarray(F, dtype=np.float64)
    if F.ndim != 2:
        raise ValueError("F must be (n, k)")
    n, k = F.shape
    if n == 0:
        return np.array([], dtype=np.int64)
    if k == 2:
        order = np.lexsort((F[:, 1], F[:, 0]))  # by f1 then f2
        best = np.inf
        keep = []
        for i in order:
            if F[i, 1] < best:
                keep.append(i)
                best = F[i, 1]
        return np.array(sorted(keep), dtype=np.int64)
    keep = np.ones(n, dtype=bool)
    for i in range(n):
        if not keep[i]:
            continue
        dominated = np.all(F <= F[i], axis=1) & np.any(F < F[i], axis=1)
        if dominated.any():
            keep[i] = False
            continue
        dominates = np.all(F[i] <= F, axis=1) & np.any(F[i] < F, axis=1)
        keep &= ~dominates
        keep[i] = True
    return np.flatnonzero(keep)


def dominates(a: np.ndarray, b: np.ndarray) -> bool:
    """True iff point ``a`` Pareto-dominates ``b`` (Def. 3.2)."""
    a, b = np.asarray(a), np.asarray(b)
    return bool(np.all(a <= b) and np.any(a < b))


def hypervolume_2d(F: np.ndarray, ref: np.ndarray) -> float:
    """Dominated 2-D hypervolume of the Pareto front of ``F`` w.r.t. ``ref``.

    Points outside ``ref`` contribute only their clipped part.
    """
    F = np.asarray(F, dtype=np.float64)
    ref = np.asarray(ref, dtype=np.float64)
    if len(F) == 0:
        return 0.0
    idx = pareto_indices(F)
    P = F[idx]
    P = P[np.argsort(P[:, 0])]
    hv = 0.0
    prev_f2 = ref[1]
    for f1, f2 in P:
        f1c, f2c = min(f1, ref[0]), min(f2, ref[1])
        if f2c < prev_f2 and f1c < ref[0]:
            hv += (ref[0] - f1c) * (prev_f2 - f2c)
            prev_f2 = f2c
    return float(hv)


def normalize(F: np.ndarray, lo: np.ndarray | None = None,
              hi: np.ndarray | None = None) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Min-max normalize objectives to [0, 1]; returns (Fn, lo, hi)."""
    F = np.asarray(F, dtype=np.float64)
    lo = F.min(axis=0) if lo is None else np.asarray(lo, dtype=np.float64)
    hi = F.max(axis=0) if hi is None else np.asarray(hi, dtype=np.float64)
    span = np.where(hi > lo, hi - lo, 1.0)
    return (F - lo) / span, lo, hi


def wun_select(F: np.ndarray, weights: np.ndarray,
               lo: np.ndarray | None = None, hi: np.ndarray | None = None) -> int:
    """Weighted-Utopia-Nearest recommendation (paper §3.3.2).

    Normalizes the Pareto points, places the Utopia point at the normalized
    origin, and returns the index minimizing the weighted Euclidean
    distance ``|| w ⊙ F_norm ||``.
    """
    F = np.asarray(F, dtype=np.float64)
    if len(F) == 0:
        raise ValueError("empty Pareto set")
    w = np.asarray(weights, dtype=np.float64)
    Fn, _, _ = normalize(F, lo, hi)
    d = np.sqrt(((w * Fn) ** 2).sum(axis=1))
    return int(np.argmin(d))
