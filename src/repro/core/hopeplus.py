"""HOPE+ (Algorithms 2 and 3): two-stage optimisation with FNEM/SNEM rounding.

Stage 1 — approximate the k largest eigenvectors L of H Hᵀ without ever
materialising it: compute the HOP low-rank approximation X (shared with
HOPE), then a k-truncated SVD of X.  Because X is |U| x β with small β,
the SVD reduces to an eigen-decomposition of the β x β Gram Xᵀ X
(driver-side numpy) followed by one distributed skinny product
L = X · V_k · Σ_k⁻¹  (Lemma 4.3).

Stage 2 — round L into a vertex-cluster-membership-indicator matrix C
(Eq. 10) by alternating updates of a k x k rotation T and C (Alg. 3):

* FNEM: T = Φ Ψᵀ from the SVD of Lᵀ C (orthogonal Procrustes, Lemma 4.4)
* SNEM: T = Lᵀ C (Lemma 4.5)

The distributed layout: L stays a skinny DataFrame; C is represented by
an assignment DataFrame ``(id, cluster)`` plus the implicit 1/sqrt(|C_j|)
column scaling.  Each iteration needs one k x k aggregate (Lᵀ C), one
broadcast map (argmax of the rows of L·T), and one count of changed
labels — all O(|U|·k) dataflow, O(k²) driver state.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from ..linalg import gram, matmul_small
from ..linalg.skinny import colwise_maxabs_value
from .hope import hop_embedding


def truncated_svd_of_skinny(x: DataFrame, beta: int, k: int
                            ) -> tuple[DataFrame, np.ndarray]:
    """Top-k left singular vectors L of a skinny matrix X via the Gram
    trick: eigh(XᵀX) -> V, σ²; L = X V_k diag(1/σ_k).

    Each column of L is flipped so its largest-magnitude entry is
    positive: eigenvector signs are arbitrary, but the greedy argmax
    seeding of the rounding stage (Lines 6-10 of Alg. 2) needs the
    Perron-like leading eigenvector of X Xᵀ (a non-negative matrix)
    oriented non-negatively, else the seeding collapses.
    """
    G = gram(x, beta)
    w, V = np.linalg.eigh((G + G.T) / 2)
    order = np.argsort(w)[::-1][:k]
    s = np.sqrt(np.maximum(w[order], 1e-300))
    L = matmul_small(x, V[:, order] / s[None, :]).localCheckpoint(eager=True)
    flip = np.sign(colwise_maxabs_value(L, k))
    flip[flip == 0] = 1.0
    if (flip < 0).any():
        L = matmul_small(L, np.diag(flip)).localCheckpoint(eager=True)
    return L, s


def _argmax_assign(l_df: DataFrame, t: np.ndarray | None = None) -> DataFrame:
    """(id, cluster) with cluster = argmax_j (L T)_{i,j} (T=I if None).

    `array_position(vec, array_max(vec))` is 1-based; ties resolve to the
    first maximal column, matching numpy argmax.
    """
    m = l_df if t is None else matmul_small(l_df, t)
    return m.select(
        "id",
        (F.expr("array_position(vec, array_max(vec))").cast("int") - 1
         ).alias("cluster"),
    )


def _rounding_step(l_df: DataFrame, t: np.ndarray | None, k: int
                   ) -> tuple[np.ndarray, np.ndarray]:
    """One fused pass over L: assign every row to argmax_j (L T)_{i,j}
    (T = I when None, i.e. the greedy seeding), and return the raw
    per-cluster L-row sums S (k x k, column j = Σ_{i∈C_j} L_i) together
    with the cluster sizes.

    This is the whole per-iteration dataflow of Algorithm 3 as a single
    narrow mapInPandas job (no shuffle): T is k x k and broadcast, each
    partition emits its partial S and counts, the driver reduces them.
    """
    spark = l_df.sparkSession
    bc = spark.sparkContext.broadcast(
        None if t is None else np.asarray(t, dtype=np.float64))

    def partial(batches):
        S = np.zeros((k, k))
        cnt = np.zeros(k)
        seen = False
        for pdf in batches:
            if len(pdf):
                L = np.vstack(pdf["vec"].to_numpy())
                M = L if bc.value is None else L @ bc.value
                cl = M.argmax(axis=1)
                np.add.at(S.T, cl, L)   # S[:, j] += L rows with cluster j
                cnt += np.bincount(cl, minlength=k)
                seen = True
        if seen:
            yield pd.DataFrame({"s": [np.concatenate([S.ravel(), cnt])]})

    parts = l_df.mapInPandas(partial, "s array<double>").toPandas()
    if len(parts) == 0:
        return np.zeros((k, k)), np.zeros(k)
    tot = np.sum(np.vstack(parts["s"].to_numpy()), axis=0)
    return tot[: k * k].reshape(k, k), tot[k * k:]


def _lt_c_from_raw(s_raw: np.ndarray, sizes: np.ndarray) -> np.ndarray:
    """Lᵀ C with Eq. 10's 1/sqrt(|C_j|) column normalisation."""
    return s_raw / np.sqrt(np.maximum(sizes, 1.0))[None, :]


def fnem_update(ltc: np.ndarray) -> np.ndarray:
    """FNEM rule (Lemma 4.4): T = Φ Ψᵀ from the SVD of Lᵀ C."""
    Phi, _, PsiT = np.linalg.svd(ltc)
    return Phi @ PsiT


def snem_update(ltc: np.ndarray) -> np.ndarray:
    """SNEM rule (Lemma 4.5): T = Lᵀ C."""
    return ltc


def hopeplus(edges: DataFrame, k: int, *, alpha: float = 0.3,
             beta: int | None = None, urt: str = "snem", t_max: int = 50,
             seed: int = 42, svd_iter: int = 6) -> DataFrame:
    """HOPE+ (Algorithm 2).  ``urt`` selects the rounding rule
    ('fnem' | 'snem').  Returns ``(id, cluster)`` over the u ids."""
    if urt not in ("fnem", "snem"):
        raise ValueError(f"urt must be 'fnem' or 'snem', got {urt!r}")
    beta = beta or 5 * k
    x, _ = hop_embedding(edges, alpha=alpha, beta=beta, seed=seed,
                         n_iter=svd_iter)
    beta_eff = len(x.select("vec").head()["vec"])
    l_df, _ = truncated_svd_of_skinny(x, beta_eff, k)

    # Stage 2 (Alg. 3).  Each iteration is one narrow Spark pass that
    # both applies the current rotation T (greedy seeding when T = None)
    # and aggregates the statistics for the next T.  Convergence: C is a
    # deterministic function of T, and T of (S, sizes), so if the
    # aggregated (S, sizes) repeats, C has converged (or entered a
    # 2-cycle of boundary vertices — SNEM can oscillate forever on a
    # handful of rows, at which point iterating has no metric effect).
    update = fnem_update if urt == "fnem" else snem_update
    t: np.ndarray | None = None  # greedy seeding first
    history: list[tuple[np.ndarray, np.ndarray]] = []
    for _ in range(t_max + 1):
        s_raw, sizes = _rounding_step(l_df, t, k)
        if any(np.allclose(s_raw, s0, rtol=1e-12, atol=1e-12)
               and np.array_equal(sizes, z0) for s0, z0 in history):
            break
        history = (history + [(s_raw, sizes)])[-6:]
        t = update(_lt_c_from_raw(s_raw, sizes))
    return _argmax_assign(l_df, t)
