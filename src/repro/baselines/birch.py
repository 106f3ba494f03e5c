"""Birch baseline [69]: single-pass CF-leaf clustering + global refinement.

A faithful CF-tree over |V|-dimensional sparse rows is impractical, so —
as the Birch paper itself suggests for high-dimensional data — points are
first sketched to ``proj_dim`` dimensions with a random projection, then
inserted into a flat list of CF leaves (threshold insertion with a leaf
cap, the degenerate single-level CF tree), and finally the leaf centroids
are clustered with weighted k-means and labels are mapped back.
"""
from __future__ import annotations

import numpy as np

from ..sparsela import lloyd
from ..synth_data import BipartiteDataset
from .common import adjacency


def birch_baseline(ds: BipartiteDataset, k: int, *, seed: int = 0,
                   proj_dim: int = 64, max_leaves: int = 2000) -> np.ndarray:
    a = adjacency(ds)
    n = a.shape[0]
    rng = np.random.default_rng(seed)
    R = rng.standard_normal((a.shape[1], proj_dim)) / np.sqrt(proj_dim)
    X = a.matmat(R)
    norms = np.linalg.norm(X, axis=1, keepdims=True)
    X = X / np.maximum(norms, 1e-300)

    # Threshold from the scatter of a small sample (||a-b||^2 expansion).
    samp = X[rng.choice(n, size=min(n, 300), replace=False)]
    sq = (samp ** 2).sum(axis=1)
    d2 = np.maximum(sq[:, None] - 2 * samp @ samp.T + sq[None, :], 0.0)
    d = np.sqrt(d2)
    threshold = np.quantile(d[d > 1e-12], 0.1) if (d > 1e-12).any() else 0.5

    # Single-pass CF insertion into preallocated leaf arrays.
    C = np.zeros((max_leaves, proj_dim))
    S = np.zeros((max_leaves, proj_dim))
    cnt = np.zeros(max_leaves)
    n_leaves = 0
    leaf_of = np.zeros(n, dtype=np.int64)
    for i in range(n):
        x = X[i]
        if n_leaves:
            diff = C[:n_leaves] - x
            dist = np.sqrt(np.einsum("ij,ij->i", diff, diff))
            j = int(dist.argmin())
            if dist[j] <= threshold or n_leaves >= max_leaves:
                S[j] += x
                cnt[j] += 1
                C[j] = S[j] / cnt[j]
                leaf_of[i] = j
                continue
        C[n_leaves] = x
        S[n_leaves] = x
        cnt[n_leaves] = 1
        leaf_of[i] = n_leaves
        n_leaves += 1

    leaf_labels = lloyd(C[:n_leaves], k, seed=seed, weights=cnt[:n_leaves])
    return leaf_labels[leaf_of]
