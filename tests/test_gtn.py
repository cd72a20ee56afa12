"""Unit tests for the GTN plan embedder."""
import numpy as np
import pytest

from repro.model.features import OP_FEAT_DIM
from repro.model.gtn import EMB_DIM, GTNEmbedder


@pytest.fixture(scope="module")
def gtn():
    return GTNEmbedder(OP_FEAT_DIM)


def _chain(n):
    return [(i, i + 1) for i in range(n - 1)]


def test_embedding_shape(gtn):
    X = np.random.default_rng(0).random((5, OP_FEAT_DIM))
    e = gtn.embed(X, _chain(5))
    assert e.shape == (EMB_DIM,)
    assert np.all(np.isfinite(e))


def test_embedding_deterministic():
    X = np.random.default_rng(1).random((4, OP_FEAT_DIM))
    a = GTNEmbedder(OP_FEAT_DIM).embed(X, _chain(4))
    b = GTNEmbedder(OP_FEAT_DIM).embed(X, _chain(4))
    np.testing.assert_allclose(a, b)


def test_sensitive_to_features(gtn):
    rng = np.random.default_rng(2)
    X1 = rng.random((4, OP_FEAT_DIM))
    X2 = X1.copy()
    X2[0] += 1.0
    e1 = gtn.embed(X1, _chain(4))
    e2 = gtn.embed(X2, _chain(4))
    assert not np.allclose(e1, e2)


def test_sensitive_to_structure(gtn):
    X = np.random.default_rng(3).random((4, OP_FEAT_DIM))
    e_chain = gtn.embed(X, _chain(4))
    e_star = gtn.embed(X, [(0, 3), (1, 3), (2, 3)])
    assert not np.allclose(e_chain, e_star)


def test_single_node(gtn):
    X = np.random.default_rng(4).random((1, OP_FEAT_DIM))
    e = gtn.embed(X, [])
    assert np.all(np.isfinite(e))


def test_laplacian_pe_orthogonal(gtn):
    pe = gtn._laplacian_pe(6, _chain(6))
    assert pe.shape == (6, gtn.pe_dim)
    # eigenvectors of a symmetric matrix are orthogonal
    G = pe.T @ pe
    off = G - np.diag(np.diag(G))
    assert np.abs(off).max() < 1e-8


def test_laplacian_pe_pads_small_graphs(gtn):
    pe = gtn._laplacian_pe(2, [(0, 1)])
    assert pe.shape == (2, gtn.pe_dim)
    assert np.all(np.isfinite(pe))


def test_permutation_changes_embedding_via_pe(gtn):
    """Node order matters through positional encoding/topology — two
    different graphs over the same multiset of features differ."""
    rng = np.random.default_rng(5)
    X = rng.random((5, OP_FEAT_DIM))
    e1 = gtn.embed(X, _chain(5))
    e2 = gtn.embed(X[::-1].copy(), _chain(5))
    assert not np.allclose(e1, e2)
