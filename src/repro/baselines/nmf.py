"""NMF baseline [61]: Frobenius-loss multiplicative updates (Lee–Seung)
on the bi-adjacency matrix A ≈ W Hᵀ; the cluster of u is argmax_j W_{u,j}.

The sparse A only appears in the products A·H and Aᵀ·W (O(|E|·k) each),
so nothing |U| x |V| is ever densified.
"""
from __future__ import annotations

import numpy as np

from ..synth_data import BipartiteDataset
from .common import adjacency

_EPS = 1e-10


def nmf_baseline(ds: BipartiteDataset, k: int, *, seed: int = 0,
                 n_iter: int = 100) -> np.ndarray:
    a = adjacency(ds)
    n_u, n_v = a.shape
    rng = np.random.default_rng(seed)
    scale = np.sqrt(a.data.mean() / k) if a.nnz else 1.0
    W = rng.random((n_u, k)) * scale + _EPS
    H = rng.random((n_v, k)) * scale + _EPS
    for _ in range(n_iter):
        # W <- W * (A H) / (W (H^T H))
        W *= a.matmat(H) / np.maximum(W @ (H.T @ H), _EPS)
        # H <- H * (A^T W) / (H (W^T W))
        H *= a.rmatmat(W) / np.maximum(H @ (W.T @ W), _EPS)
    return W.argmax(axis=1)
