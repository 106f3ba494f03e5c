"""K-Medoids baseline [29]: PAM with CLARA-style candidate sampling.

Exact PAM needs the full |U|² distance matrix; the paper's K-Medoids
likewise blows up beyond medium graphs (dashes in Table 5).  We sample
up to ``max_sample`` candidate points, run PAM (build + swap) on their
cosine-distance matrix, then assign every point to its nearest medoid
with one sparse product.
"""
from __future__ import annotations

import numpy as np

from ..synth_data import BipartiteDataset
from .common import adjacency


def _sample_dense_rows(a, idx: np.ndarray) -> np.ndarray:
    """Dense copy of the selected rows of a SparseCOO matrix."""
    pos = np.full(a.shape[0], -1, dtype=np.int64)
    pos[idx] = np.arange(len(idx))
    mask = pos[a.rows] >= 0
    out = np.zeros((len(idx), a.shape[1]))
    np.add.at(out, (pos[a.rows[mask]], a.cols[mask]), a.data[mask])
    return out


def kmedoids_baseline(ds: BipartiteDataset, k: int, *, seed: int = 0,
                      max_sample: int = 1500, n_iter: int = 30) -> np.ndarray:
    a = adjacency(ds)
    n = a.shape[0]
    rng = np.random.default_rng(seed)
    m = min(n, max_sample)
    sample = rng.choice(n, size=m, replace=False) if m < n else np.arange(n)

    S = _sample_dense_rows(a, sample)
    norms = np.linalg.norm(S, axis=1)
    Sn = S / np.maximum(norms, 1e-300)[:, None]
    D = 1.0 - Sn @ Sn.T  # cosine distance among candidates
    np.fill_diagonal(D, 0.0)

    # BUILD: greedy k-medoids++ seeding, then SWAP sweeps.
    medoids = [int(rng.integers(m))]
    d_near = D[medoids[0]].copy()
    for _ in range(1, k):
        medoids.append(int(d_near.argmax()))
        d_near = np.minimum(d_near, D[medoids[-1]])
    medoids = np.asarray(medoids)
    for _ in range(n_iter):
        assign = D[:, medoids].argmin(axis=1)
        new_medoids = medoids.copy()
        for j in range(k):
            members = np.nonzero(assign == j)[0]
            if len(members):
                costs = D[np.ix_(members, members)].sum(axis=0)
                new_medoids[j] = members[costs.argmin()]
        if (new_medoids == medoids).all():
            break
        medoids = new_medoids

    # Assign all points by cosine distance to the k medoid rows.
    M = Sn[medoids]  # k x |V|, unit rows
    sim = a.matmat(M.T)  # |U| x k
    row_norms = a.row_norms()
    sim /= np.maximum(row_norms, 1e-300)[:, None]
    return sim.argmax(axis=1)
