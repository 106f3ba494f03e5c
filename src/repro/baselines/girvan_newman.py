"""Girvan–Newman baseline [20]: iterative removal of high-betweenness
edges until k connected components remain, on the unipartite view.

Exact GN is O(|U|·|E|²) — the paper only reports it on the two smallest
datasets and it is by far the slowest method there.  This implementation
keeps the algorithm but bounds the constant factors:

* Brandes edge betweenness from a *sampled* set of source vertices
  (``n_sources``), the standard approximation for large graphs;
* a *batch* of the top ``batch_frac`` fraction of edges is removed per
  round instead of a single edge;
* a hard cap on rounds.

Tests exercise the exact behaviour on tiny graphs (single-edge batches,
all sources) against networkx as an oracle.
"""
from __future__ import annotations

from collections import deque

import numpy as np

from ..synth_data import BipartiteDataset
from .common import unipartite


def _adjacency_lists(n: int, rows: np.ndarray, cols: np.ndarray,
                     alive: np.ndarray) -> list[list[tuple[int, int]]]:
    """Per-vertex list of (neighbour, edge_id) over alive edges."""
    adj: list[list[tuple[int, int]]] = [[] for _ in range(n)]
    for eid in np.nonzero(alive)[0]:
        i, j = int(rows[eid]), int(cols[eid])
        adj[i].append((j, eid))
    return adj


def edge_betweenness(n: int, rows: np.ndarray, cols: np.ndarray,
                     alive: np.ndarray, *, sources: np.ndarray) -> np.ndarray:
    """Brandes betweenness restricted to the given BFS sources (unweighted
    shortest paths; exact when sources = all vertices)."""
    adj = _adjacency_lists(n, rows, cols, alive)
    bc = np.zeros(len(rows))
    for s in sources:
        # BFS
        dist = np.full(n, -1, dtype=np.int64)
        sigma = np.zeros(n)
        dist[s] = 0
        sigma[s] = 1.0
        order: list[int] = []
        preds: list[list[tuple[int, int]]] = [[] for _ in range(n)]
        dq = deque([int(s)])
        while dq:
            v = dq.popleft()
            order.append(v)
            for w_, eid in adj[v]:
                if dist[w_] < 0:
                    dist[w_] = dist[v] + 1
                    dq.append(w_)
                if dist[w_] == dist[v] + 1:
                    sigma[w_] += sigma[v]
                    preds[w_].append((v, eid))
        # Accumulation
        delta = np.zeros(n)
        for w_ in reversed(order):
            for v, eid in preds[w_]:
                c = sigma[v] / sigma[w_] * (1.0 + delta[w_])
                bc[eid] += c
                delta[v] += c
    return bc


def _components(n: int, rows: np.ndarray, cols: np.ndarray,
                alive: np.ndarray) -> np.ndarray:
    """Connected-component labels via BFS over alive edges."""
    adj = _adjacency_lists(n, rows, cols, alive)
    comp = np.full(n, -1, dtype=np.int64)
    c = 0
    for s in range(n):
        if comp[s] >= 0:
            continue
        comp[s] = c
        dq = deque([s])
        while dq:
            v = dq.popleft()
            for w_, _ in adj[v]:
                if comp[w_] < 0:
                    comp[w_] = c
                    dq.append(w_)
        c += 1
    return comp


def girvan_newman_baseline(ds: BipartiteDataset, k: int, *, seed: int = 0,
                           n_sources: int = 64, batch_frac: float = 0.01,
                           max_rounds: int = 200) -> np.ndarray:
    a = unipartite(ds)
    # Deduplicate to one undirected record per edge (rows < cols), BFS is
    # run on the symmetric adjacency built per round.
    und = a.rows < a.cols
    rows, cols = a.rows[und], a.cols[und]
    n = a.shape[0]
    m = len(rows)
    # Symmetric edge arrays sharing one betweenness counter per edge.
    rr = np.concatenate([rows, cols])
    cc = np.concatenate([cols, rows])
    alive = np.ones(2 * m, dtype=bool)
    rng = np.random.default_rng(seed)

    comp = _components(n, rr, cc, alive)
    for _ in range(max_rounds):
        if comp.max() + 1 >= k:
            break
        ns = min(n_sources, n)
        sources = rng.choice(n, size=ns, replace=False) if ns < n else np.arange(n)
        bc = edge_betweenness(n, rr, cc, alive, sources=sources)
        bc = bc[:m] + bc[m:]  # merge both orientations
        bc[~alive[:m]] = -1.0
        n_remove = max(1, int(batch_frac * alive[:m].sum()))
        victims = np.argsort(bc)[::-1][:n_remove]
        alive[victims] = False
        alive[victims + m] = False
        comp = _components(n, rr, cc, alive)

    # Components -> k labels: keep the k-1 largest, pool the rest.
    sizes = np.bincount(comp)
    order = np.argsort(sizes)[::-1]
    relabel = np.full(len(sizes), k - 1, dtype=np.int64)
    relabel[order[: k - 1]] = np.arange(min(k - 1, len(order)))
    return relabel[comp][: ds.n_u]
