"""Shared helpers for the baseline competitors.

Every baseline consumes a :class:`repro.synth_data.BipartiteDataset` (or
the raw edge arrays) and returns integer labels for the U side.  They run
on the numpy sparse substrate — consistent with the paper, where these
reference methods are the ones that do *not* scale (Table 5 dashes).
"""
from __future__ import annotations

import numpy as np

from ..sparsela import SparseCOO
from ..synth_data import BipartiteDataset


def adjacency(ds: BipartiteDataset) -> SparseCOO:
    """Weighted bi-adjacency matrix A in R^{|U| x |V|}."""
    e = ds.edges
    return SparseCOO.from_edges(e["u"].to_numpy(), e["v"].to_numpy(),
                                e["w"].to_numpy(), ds.n_u, ds.n_v)


def unipartite(ds: BipartiteDataset) -> SparseCOO:
    """Symmetric (|U|+|V|) x (|U|+|V|) adjacency of the unipartite view
    (U vertices first, V vertices shifted by |U|)."""
    e = ds.edges
    u = e["u"].to_numpy()
    v = e["v"].to_numpy() + ds.n_u
    w = e["w"].to_numpy()
    n = ds.n_u + ds.n_v
    return SparseCOO.from_edges(
        np.concatenate([u, v]), np.concatenate([v, u]),
        np.concatenate([w, w]), n, n,
    )


def cluster_sums(a: SparseCOO, labels: np.ndarray, k: int) -> np.ndarray:
    """S[j] = sum of the rows of ``a`` whose label is j (dense k x n_cols).
    The centroid-update kernel for sparse k-means/NMF-style loops."""
    S = np.zeros((k, a.shape[1]))
    np.add.at(S, (labels[a.rows], a.cols), a.data)
    return S
