"""Clustering-quality metrics used in the paper's Tables 4 and 5.

Acc (clustering accuracy via optimal Hungarian label matching), F1
(macro-F1 after the same optimal matching), NMI (normalized mutual
information, arithmetic normalization as in Strehl & Ghosh [50]) and ARI
(adjusted Rand index, Hubert & Arabie [27]).  All computed from the
contingency matrix between predicted and ground-truth partitions; no
sklearn in this environment, so everything is built on numpy.
"""
from __future__ import annotations

import numpy as np

from .hungarian import linear_sum_assignment


def _contingency(labels_true: np.ndarray, labels_pred: np.ndarray) -> np.ndarray:
    """Dense contingency matrix ``C[t, p]`` = #points with true label t and
    predicted label p, after re-indexing both label sets to 0..k-1."""
    labels_true = np.asarray(labels_true)
    labels_pred = np.asarray(labels_pred)
    if labels_true.shape != labels_pred.shape:
        raise ValueError("label arrays must have equal length")
    _, ti = np.unique(labels_true, return_inverse=True)
    _, pi = np.unique(labels_pred, return_inverse=True)
    nt, np_ = ti.max() + 1, pi.max() + 1
    cm = np.zeros((nt, np_), dtype=np.int64)
    np.add.at(cm, (ti, pi), 1)
    return cm


def best_matching(labels_true, labels_pred) -> dict[int, int]:
    """Optimal predicted-cluster -> true-cluster map (Hungarian on -C)."""
    cm = _contingency(labels_true, labels_pred)
    rows, cols = linear_sum_assignment(-cm.astype(np.float64))
    return {int(c): int(r) for r, c in zip(rows, cols)}


def accuracy(labels_true, labels_pred) -> float:
    """Clustering accuracy: max over label permutations of the fraction of
    correctly assigned points (computed exactly via Hungarian matching)."""
    cm = _contingency(labels_true, labels_pred)
    rows, cols = linear_sum_assignment(-cm.astype(np.float64))
    return float(cm[rows, cols].sum() / cm.sum())


def f1_score(labels_true, labels_pred) -> float:
    """Macro-averaged F1 after optimal Hungarian matching of clusters to
    ground-truth classes (unmatched true classes contribute F1 = 0)."""
    cm = _contingency(labels_true, labels_pred)
    rows, cols = linear_sum_assignment(-cm.astype(np.float64))
    row_sum = cm.sum(axis=1)  # true class sizes
    col_sum = cm.sum(axis=0)  # predicted cluster sizes
    f1s = np.zeros(cm.shape[0])
    for r, c in zip(rows, cols):
        tp = cm[r, c]
        if tp == 0:
            continue
        prec = tp / col_sum[c]
        rec = tp / row_sum[r]
        f1s[r] = 2 * prec * rec / (prec + rec)
    return float(f1s.mean())


def nmi(labels_true, labels_pred) -> float:
    """Normalized mutual information, NMI = 2 I(T;P) / (H(T) + H(P))."""
    cm = _contingency(labels_true, labels_pred).astype(np.float64)
    n = cm.sum()
    pij = cm / n
    pi = pij.sum(axis=1)
    pj = pij.sum(axis=0)
    nz = pij > 0
    outer = np.outer(pi, pj)
    mi = float((pij[nz] * np.log(pij[nz] / outer[nz])).sum())
    h_t = float(-(pi[pi > 0] * np.log(pi[pi > 0])).sum())
    h_p = float(-(pj[pj > 0] * np.log(pj[pj > 0])).sum())
    denom = h_t + h_p
    if denom == 0.0:  # both partitions trivial -> identical
        return 1.0
    return float(max(0.0, 2.0 * mi / denom))


def ari(labels_true, labels_pred) -> float:
    """Adjusted Rand index (expected-chance-corrected pair-counting)."""
    cm = _contingency(labels_true, labels_pred).astype(np.float64)
    n = cm.sum()

    def comb2(x):
        return x * (x - 1) / 2.0

    sum_ij = comb2(cm).sum()
    sum_i = comb2(cm.sum(axis=1)).sum()
    sum_j = comb2(cm.sum(axis=0)).sum()
    total = comb2(n)
    expected = sum_i * sum_j / total if total > 0 else 0.0
    max_index = (sum_i + sum_j) / 2.0
    if max_index == expected:
        return 1.0 if sum_ij == expected else 0.0
    return float((sum_ij - expected) / (max_index - expected))


def all_metrics(labels_true, labels_pred) -> dict[str, float]:
    """Acc/F1/NMI/ARI in one call — the four columns of Tables 4 and 5."""
    return {
        "acc": accuracy(labels_true, labels_pred),
        "f1": f1_score(labels_true, labels_pred),
        "nmi": nmi(labels_true, labels_pred),
        "ari": ari(labels_true, labels_pred),
    }
