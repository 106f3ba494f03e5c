"""Hungarian (Kuhn–Munkres) assignment, O(n^3).

scipy is not available in this environment, so the linear-sum-assignment
solver used by the clustering-accuracy metric is implemented here from
scratch.  The implementation is the classic potentials + augmenting-path
formulation (Jonker–Volgenant style shortest augmenting paths), operating
on a rectangular cost matrix.
"""
from __future__ import annotations

import numpy as np


def linear_sum_assignment(cost: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Solve min-cost perfect matching on a rectangular cost matrix.

    Returns ``(row_ind, col_ind)`` such that ``cost[row_ind, col_ind].sum()``
    is minimal, matching scipy's API.  Rows are matched to distinct columns;
    if the matrix is wider than tall, some columns stay unmatched (and
    vice versa after an internal transpose).
    """
    cost = np.asarray(cost, dtype=np.float64)
    if cost.ndim != 2:
        raise ValueError("cost must be a 2-D matrix")
    transposed = cost.shape[0] > cost.shape[1]
    if transposed:
        cost = cost.T
    n, m = cost.shape  # n <= m

    # Potentials-based shortest augmenting path (1-indexed sentinel col 0).
    u = np.zeros(n + 1)
    v = np.zeros(m + 1)
    # p[j] = row assigned to column j (0 = free), for j in 1..m
    p = np.zeros(m + 1, dtype=np.int64)
    way = np.zeros(m + 1, dtype=np.int64)
    for i in range(1, n + 1):
        p[0] = i
        j0 = 0
        minv = np.full(m + 1, np.inf)
        used = np.zeros(m + 1, dtype=bool)
        while True:
            used[j0] = True
            i0 = p[j0]
            delta = np.inf
            j1 = -1
            cur = cost[i0 - 1, :] - u[i0] - v[1:]
            better = ~used[1:] & (cur < minv[1:])
            minv[1:][better] = cur[better]
            way[1:][better] = j0
            free = ~used[1:]
            if free.any():
                idx = np.argmin(np.where(free, minv[1:], np.inf))
                delta = minv[idx + 1]
                j1 = idx + 1
            u[p[used]] += delta
            v[used] -= delta
            minv[1:][~used[1:]] -= delta
            j0 = j1
            if p[j0] == 0:
                break
        while j0:
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1

    row_of_col = p[1:]  # row matched to each column, 0 if none
    cols = np.nonzero(row_of_col)[0]
    rows = row_of_col[cols] - 1
    order = np.argsort(rows)
    rows, cols = rows[order], cols[order]
    if transposed:
        return cols, rows
    return rows, cols
