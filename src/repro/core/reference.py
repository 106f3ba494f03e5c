"""NumPy reference implementations of the paper's math.

Used as the exactness oracle for the distributed Spark path on small
graphs, and by unit tests that verify the paper's lemmas numerically:

* exact HOP matrix H via the closed form of Lemma 3.1 (full dense SVD),
* reference HOPE (Alg. 1) and HOPE+ (Algs. 2-3) on the
  :class:`~repro.sparsela.SparseCOO` substrate.
"""
from __future__ import annotations

import numpy as np

from ..sparsela import SparseCOO, lloyd, randomized_svd


# -- graph matrices ---------------------------------------------------------

def build_pq(edges_u: np.ndarray, edges_v: np.ndarray, edges_w: np.ndarray,
             n_u: int, n_v: int) -> tuple[SparseCOO, SparseCOO]:
    """(P, Q) from an edge list.  P is |U| x |V| with p(u,v) = w/deg(u);
    Q is |V| x |U| with Q_{v,u} = w / sqrt(deg(u) deg(v))."""
    A = SparseCOO.from_edges(edges_u, edges_v, edges_w, n_u, n_v)
    deg_u = A.row_sums()
    deg_v = A.col_sums()
    inv_u = np.where(deg_u > 0, 1.0 / np.maximum(deg_u, 1e-300), 0.0)
    P = A.scale_rows(inv_u)
    inv_sq = np.where(deg_u > 0, 1.0 / np.sqrt(np.maximum(deg_u, 1e-300)), 0.0)
    inv_sv = np.where(deg_v > 0, 1.0 / np.sqrt(np.maximum(deg_v, 1e-300)), 0.0)
    Q = A.T.scale_rows(inv_sv).scale_cols(inv_sq)
    return P, Q


def exact_hop_matrix(P: SparseCOO, Q: SparseCOO, alpha: float) -> np.ndarray:
    """Exact H (row-normalised F) via Lemma 3.1 with a *full* dense SVD of
    Q — O(|V|²|U|), tiny graphs only."""
    Qd = Q.to_dense()
    U, s, _ = np.linalg.svd(Qd, full_matrices=False)
    lam = (1.0 - alpha) / (1.0 - alpha * np.minimum(s, 1.0) ** 2)
    F = P.to_dense() @ (U * lam[None, :]) @ U.T
    norms = np.linalg.norm(F, axis=1, keepdims=True)
    return F / np.maximum(norms, 1e-300)


def exact_f_series(P: SparseCOO, Q: SparseCOO, alpha: float,
                   n_terms: int = 200) -> np.ndarray:
    """F by direct summation of Eq. (5) — the independent check that the
    Lemma-3.1 closed form actually equals the infinite series."""
    W = Q.to_dense() @ Q.to_dense().T
    Pd = P.to_dense()
    term = Pd.copy()
    F = np.zeros_like(Pd)
    for lam in range(n_terms):
        F += (1.0 - alpha) * alpha ** lam * term
        term = term @ W
    return F


# -- HOPE reference ---------------------------------------------------------

def hop_embedding_ref(P: SparseCOO, Q: SparseCOO, alpha: float, beta: int,
                      *, seed: int = 0, n_iter: int = 8
                      ) -> tuple[np.ndarray, np.ndarray]:
    """X (unit rows, |U| x β) and singular values — numpy mirror of
    :func:`repro.core.hope.hop_embedding`."""
    U, s, _ = randomized_svd(Q, beta, seed=seed, n_iter=n_iter)
    lam = (1.0 - alpha) / (1.0 - alpha * np.minimum(s, 1.0) ** 2)
    X_hat = P.matmat(U * lam[None, :])
    norms = np.linalg.norm(X_hat, axis=1, keepdims=True)
    return X_hat / np.maximum(norms, 1e-300), s


def hope_ref(P: SparseCOO, Q: SparseCOO, k: int, *, alpha: float = 0.3,
             beta: int | None = None, seed: int = 0) -> np.ndarray:
    beta = beta or 5 * k
    X, _ = hop_embedding_ref(P, Q, alpha, beta, seed=seed)
    return lloyd(X, k, seed=seed)


# -- HOPE+ reference --------------------------------------------------------

def rounding_ref(L: np.ndarray, k: int, *, urt: str = "snem",
                 t_max: int = 100) -> np.ndarray:
    """Algorithm 3 in numpy: alternate T and C updates until C is stable."""
    labels = L.argmax(axis=1)
    for _ in range(t_max):
        # L^T C with C's 1/sqrt(|C_j|) column scaling (Eq. 10).
        sizes = np.bincount(labels, minlength=k).astype(np.float64)
        S = np.zeros((L.shape[1], k))
        for j in range(k):
            if sizes[j]:
                S[:, j] = L[labels == j].sum(axis=0) / np.sqrt(sizes[j])
        if urt == "fnem":
            Phi, _, PsiT = np.linalg.svd(S)
            T = Phi @ PsiT
        else:
            T = S
        new_labels = (L @ T).argmax(axis=1)
        if (new_labels == labels).all():
            break
        labels = new_labels
    return labels


def hopeplus_ref(P: SparseCOO, Q: SparseCOO, k: int, *, alpha: float = 0.3,
                 beta: int | None = None, urt: str = "snem", seed: int = 0,
                 t_max: int = 100) -> np.ndarray:
    beta = beta or 5 * k
    X, _ = hop_embedding_ref(P, Q, alpha, beta, seed=seed)
    # k-truncated SVD of X via the Gram trick (same as the Spark path).
    G = X.T @ X
    w, V = np.linalg.eigh((G + G.T) / 2)
    order = np.argsort(w)[::-1][:k]
    s = np.sqrt(np.maximum(w[order], 1e-300))
    L = X @ (V[:, order] / s[None, :])
    # Same sign convention as the Spark path: dominant entry per column
    # positive (eigenvector signs are arbitrary; argmax seeding is not).
    flip = np.sign(L[np.abs(L).argmax(axis=0), np.arange(L.shape[1])])
    flip[flip == 0] = 1.0
    return rounding_ref(L * flip[None, :], k, urt=urt, t_max=t_max)
