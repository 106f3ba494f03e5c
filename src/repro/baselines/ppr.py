"""PPR [56] and NRP [64] baselines: personalized-PageRank features + k-means.

The paper clusters the PPR vectors (for PPR) and the NRP embeddings (for
NRP) with k-means.  Materialising all |U| PPR vectors is O(|U|·(|U|+|V|))
memory, so both baselines here use the standard *sketch*: the PPR matrix
Π = (1-α) Σ_λ α^λ T^λ (T the row-stochastic transition matrix of the
unipartite view) is applied to a random Gaussian block R via Horner
iteration Z ← R + α T Z, giving E = (1-α) Z = Π R — a Johnson–
Lindenstrauss projection of the PPR vectors that preserves the pairwise
distances k-means consumes.

NRP additionally reweights the projected coordinates by sqrt(degree) of
the target distribution, the practical core of NRP's degree-reweighting
(the original learns per-node scale factors so that embedding inner
products match degree-normalised PPR; the sqrt-degree column scaling is
its stationary fixed point).  Substitutions documented in DESIGN.md §3.
"""
from __future__ import annotations

import numpy as np

from ..sparsela import lloyd
from ..synth_data import BipartiteDataset
from .common import unipartite


def _ppr_sketch(ds: BipartiteDataset, *, alpha: float, dim: int, seed: int,
                n_iter: int = 20, degree_reweight: bool = False) -> np.ndarray:
    a = unipartite(ds)
    n = a.shape[0]
    d = a.row_sums()
    inv_d = np.where(d > 0, 1.0 / np.maximum(d, 1e-300), 0.0)
    rng = np.random.default_rng(seed)
    R = rng.standard_normal((n, dim)) / np.sqrt(dim)
    if degree_reweight:
        R *= np.sqrt(np.maximum(d, 1.0))[:, None]
    Z = R.copy()
    for _ in range(n_iter):
        # Z <- R + α T Z  with T = D^{-1} A (row-stochastic).
        Z = R + alpha * (a.matmat(Z) * inv_d[:, None])
    E = (1.0 - alpha) * Z
    norms = np.linalg.norm(E, axis=1, keepdims=True)
    return E / np.maximum(norms, 1e-300)


def ppr_baseline(ds: BipartiteDataset, k: int, *, seed: int = 0,
                 alpha: float = 0.85, dim: int = 128) -> np.ndarray:
    E = _ppr_sketch(ds, alpha=alpha, dim=dim, seed=seed)
    return lloyd(E[: ds.n_u], k, seed=seed)


def nrp_baseline(ds: BipartiteDataset, k: int, *, seed: int = 0,
                 alpha: float = 0.85, dim: int = 128) -> np.ndarray:
    E = _ppr_sketch(ds, alpha=alpha, dim=dim, seed=seed,
                    degree_reweight=True)
    return lloyd(E[: ds.n_u], k, seed=seed)
