"""Unit tests for Pareto utilities (dominance, hypervolume, WUN)."""
import numpy as np
import pytest

from repro.moo.pareto import (dominates, hypervolume_2d, normalize,
                              pareto_indices, wun_select)


def brute_force_pareto(F: np.ndarray) -> set[int]:
    keep = set()
    for i in range(len(F)):
        if not any(dominates(F[j], F[i]) for j in range(len(F)) if j != i):
            keep.add(i)
    return keep


def test_dominates_basic():
    assert dominates([1, 1], [2, 2])
    assert dominates([1, 2], [1, 3])
    assert not dominates([1, 3], [3, 1])
    assert not dominates([1, 1], [1, 1])  # equal points do not dominate


def test_pareto_simple():
    F = np.array([[1, 5], [2, 2], [5, 1], [4, 4], [6, 6]])
    idx = pareto_indices(F)
    assert set(idx) == {0, 1, 2}


def test_pareto_empty():
    assert len(pareto_indices(np.zeros((0, 2)))) == 0


def test_pareto_single():
    assert list(pareto_indices(np.array([[3.0, 4.0]]))) == [0]


def test_pareto_duplicates_kept():
    F = np.array([[1, 1], [1, 1], [2, 2]])
    idx = set(pareto_indices(F))
    assert 2 not in idx
    assert len(idx) >= 1


@pytest.mark.parametrize("seed", range(10))
def test_pareto_matches_brute_force_2d(seed):
    rng = np.random.default_rng(seed)
    F = rng.random((60, 2))
    assert set(pareto_indices(F)) == brute_force_pareto(F)


@pytest.mark.parametrize("seed", range(5))
def test_pareto_matches_brute_force_3d(seed):
    rng = np.random.default_rng(seed + 100)
    F = rng.random((40, 3))
    assert set(pareto_indices(F)) == brute_force_pareto(F)


def test_pareto_rejects_1d():
    with pytest.raises(ValueError):
        pareto_indices(np.array([1.0, 2.0]))


def test_hypervolume_single_point():
    hv = hypervolume_2d(np.array([[0.5, 0.5]]), np.array([1.0, 1.0]))
    assert hv == pytest.approx(0.25)


def test_hypervolume_staircase():
    F = np.array([[0.2, 0.8], [0.5, 0.5], [0.8, 0.2]])
    ref = np.array([1.0, 1.0])
    # sum of the staircase strips
    expected = (1 - 0.2) * (1 - 0.8) + (1 - 0.5) * (0.8 - 0.5) + (1 - 0.8) * (0.5 - 0.2)
    assert hypervolume_2d(F, ref) == pytest.approx(expected)


def test_hypervolume_dominated_points_ignored():
    F1 = np.array([[0.2, 0.2]])
    F2 = np.array([[0.2, 0.2], [0.5, 0.5], [0.9, 0.3]])
    ref = np.array([1.0, 1.0])
    assert hypervolume_2d(F1, ref) == pytest.approx(hypervolume_2d(F2, ref))


def test_hypervolume_point_outside_ref():
    assert hypervolume_2d(np.array([[2.0, 2.0]]), np.array([1.0, 1.0])) == 0.0


def test_hypervolume_empty():
    assert hypervolume_2d(np.zeros((0, 2)), np.array([1, 1])) == 0.0


def test_hypervolume_monotone_in_points():
    rng = np.random.default_rng(3)
    F = rng.random((20, 2))
    ref = np.array([1.0, 1.0])
    h1 = hypervolume_2d(F[:5], ref)
    h2 = hypervolume_2d(F, ref)
    assert h2 >= h1 - 1e-12


def test_normalize_roundtrip():
    F = np.array([[10.0, 1.0], [20.0, 3.0]])
    Fn, lo, hi = normalize(F)
    assert Fn.min() == 0.0 and Fn.max() == 1.0
    np.testing.assert_allclose(lo, [10, 1])
    np.testing.assert_allclose(hi, [20, 3])


def test_normalize_degenerate_dim():
    F = np.array([[5.0, 1.0], [5.0, 2.0]])
    Fn, _, _ = normalize(F)
    assert np.all(np.isfinite(Fn))


def test_wun_prefers_latency_with_latency_weight():
    F = np.array([[1.0, 100.0], [100.0, 1.0]])  # [latency, cost]
    assert wun_select(F, [0.9, 0.1]) == 0
    assert wun_select(F, [0.1, 0.9]) == 1


def test_wun_balanced_picks_knee():
    F = np.array([[0.0, 1.0], [0.4, 0.4], [1.0, 0.0]])
    # already normalized-ish; knee minimizes the weighted distance
    assert wun_select(F, [0.5, 0.5]) == 1


def test_wun_empty_raises():
    with pytest.raises(ValueError):
        wun_select(np.zeros((0, 2)), [0.5, 0.5])


def test_wun_single():
    assert wun_select(np.array([[3.0, 4.0]]), [0.9, 0.1]) == 0
