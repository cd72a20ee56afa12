"""Graph Transformer Network embedder (numpy forward pass).

Implements the paper's GTN embedder [6, 56]: multi-head self-attention
over the operator DAG with an additive adjacency bias and Laplacian
positional encodings, followed by a residual feed-forward block, mean-
pooled into a fixed-size plan embedding.

Weights are fixed and seeded (random-features regime): the downstream MLP
regressor is the trained component, matching the compute budget available
offline (see DESIGN.md). Embeddings are deterministic, so they can be
cached per (plan, stat-view).
"""
from __future__ import annotations

import numpy as np

EMB_DIM = 32


class GTNEmbedder:
    """Fixed-weight graph transformer producing ``EMB_DIM`` plan embeddings."""

    def __init__(self, d_in: int, *, d_model: int = EMB_DIM, n_layers: int = 2,
                 n_heads: int = 4, pe_dim: int = 4, seed: int = 7):
        rng = np.random.default_rng(seed)
        self.d_model, self.n_layers, self.n_heads, self.pe_dim = d_model, n_layers, n_heads, pe_dim
        s = 1.0 / np.sqrt(d_model)
        self.w_in = rng.normal(0, 1.0 / np.sqrt(d_in), (d_in, d_model))
        self.w_pe = rng.normal(0, 0.5, (pe_dim, d_model))
        self.layers = []
        dh = d_model // n_heads
        for _ in range(n_layers):
            self.layers.append({
                "wq": rng.normal(0, s, (n_heads, d_model, dh)),
                "wk": rng.normal(0, s, (n_heads, d_model, dh)),
                "wv": rng.normal(0, s, (n_heads, d_model, dh)),
                "wo": rng.normal(0, s, (d_model, d_model)),
                "w1": rng.normal(0, s, (d_model, 2 * d_model)),
                "w2": rng.normal(0, 1.0 / np.sqrt(2 * d_model), (2 * d_model, d_model)),
            })

    def _laplacian_pe(self, n: int, edges: list[tuple[int, int]]) -> np.ndarray:
        A = np.zeros((n, n))
        for i, j in edges:
            A[i, j] = A[j, i] = 1.0
        d = A.sum(axis=1)
        dinv = np.where(d > 0, 1.0 / np.sqrt(np.maximum(d, 1e-9)), 0.0)
        L = np.eye(n) - dinv[:, None] * A * dinv[None, :]
        vals, vecs = np.linalg.eigh(L)
        pe = vecs[:, 1:1 + self.pe_dim] if n > 1 else np.zeros((n, self.pe_dim))
        if pe.shape[1] < self.pe_dim:
            pe = np.pad(pe, ((0, 0), (0, self.pe_dim - pe.shape[1])))
        # sign-canonicalize each eigenvector (eigh sign is arbitrary)
        signs = np.where(np.abs(pe).max(axis=0) > 0,
                         np.sign(pe[np.abs(pe).argmax(axis=0), range(pe.shape[1])]), 1.0)
        return pe * np.where(signs == 0, 1.0, signs)

    def embed(self, X: np.ndarray, edges: list[tuple[int, int]]) -> np.ndarray:
        """Embed one plan graph: node features ``X`` (n, d_in) + edges."""
        n = X.shape[0]
        H = X @ self.w_in + self._laplacian_pe(n, edges) @ self.w_pe
        bias = np.full((n, n), -4.0)
        np.fill_diagonal(bias, 0.0)
        for i, j in edges:
            bias[i, j] = bias[j, i] = 0.0
        for layer in self.layers:
            heads = []
            for h in range(self.n_heads):
                q = H @ layer["wq"][h]
                k = H @ layer["wk"][h]
                v = H @ layer["wv"][h]
                att = q @ k.T / np.sqrt(q.shape[1]) + bias
                att = att - att.max(axis=1, keepdims=True)
                w = np.exp(att)
                w /= w.sum(axis=1, keepdims=True)
                heads.append(w @ v)
            H = H + np.concatenate(heads, axis=1) @ layer["wo"]
            H = H / (np.linalg.norm(H, axis=1, keepdims=True) / np.sqrt(self.d_model) + 1e-6)
            H = H + np.maximum(H @ layer["w1"], 0.0) @ layer["w2"]
        return H.mean(axis=0)
