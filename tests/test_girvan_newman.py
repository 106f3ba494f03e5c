"""Girvan–Newman: Brandes edge betweenness against the networkx oracle
(exact mode: all sources), component labelling, and end-to-end recovery
on a two-community bipartite graph."""
import networkx as nx
import numpy as np
import pandas as pd
import pytest

from repro.baselines.girvan_newman import (
    _components,
    edge_betweenness,
    girvan_newman_baseline,
)
from repro.metrics import accuracy
from repro.synth_data import BipartiteDataset, bipartite_sbm


def sym_edges(pairs):
    rows = np.array([p[0] for p in pairs] + [p[1] for p in pairs])
    cols = np.array([p[1] for p in pairs] + [p[0] for p in pairs])
    return rows, cols


class TestBetweennessVsNetworkx:
    @pytest.mark.parametrize("seed", [0, 1, 2])
    def test_matches_networkx_exact(self, seed):
        g = nx.gnm_random_graph(12, 22, seed=seed)
        pairs = list(g.edges())
        if not pairs:
            pytest.skip("empty random graph")
        rows, cols = sym_edges(pairs)
        alive = np.ones(len(rows), dtype=bool)
        bc = edge_betweenness(12, rows, cols, alive,
                              sources=np.arange(12))
        m = len(pairs)
        got = bc[:m] + bc[m:]
        want = nx.edge_betweenness_centrality(g, normalized=False)
        for idx, (a, b) in enumerate(pairs):
            # networkx counts each unordered pair once; ours accumulates
            # from every source, i.e. both directions -> factor 2.
            assert got[idx] == pytest.approx(2 * want[(a, b)], rel=1e-9)

    def test_path_graph_middle_edge_highest(self):
        pairs = [(0, 1), (1, 2), (2, 3), (3, 4)]
        rows, cols = sym_edges(pairs)
        alive = np.ones(len(rows), dtype=bool)
        bc = edge_betweenness(5, rows, cols, alive, sources=np.arange(5))
        merged = bc[:4] + bc[4:]
        assert merged.argmax() in (1, 2)  # central edges carry most paths


class TestComponents:
    def test_two_components(self):
        pairs = [(0, 1), (1, 2), (3, 4)]
        rows, cols = sym_edges(pairs)
        comp = _components(5, rows, cols, np.ones(len(rows), dtype=bool))
        assert comp[0] == comp[1] == comp[2]
        assert comp[3] == comp[4]
        assert comp[0] != comp[3]

    def test_dead_edges_ignored(self):
        pairs = [(0, 1), (1, 2)]
        rows, cols = sym_edges(pairs)
        alive = np.array([True, False, True, False])
        comp = _components(3, rows, cols, alive)
        assert comp[0] == comp[1]
        assert comp[2] != comp[0]


class TestEndToEnd:
    def _barbell(self):
        # Two dense bipartite blocks joined by a single bridge edge.
        edges = []
        for u in range(5):
            for v in range(4):
                edges.append((u, v))
        for u in range(5, 10):
            for v in range(4, 8):
                edges.append((u, v))
        edges.append((0, 4))  # bridge
        pdf = pd.DataFrame(edges, columns=["u", "v"])
        pdf["w"] = 1.0
        return BipartiteDataset(
            name="barbell", edges=pdf,
            labels_u=np.array([0] * 5 + [1] * 5),
            labels_v=np.array([0] * 4 + [1] * 4), k=2)

    def test_barbell_split(self):
        ds = self._barbell()
        lab = girvan_newman_baseline(ds, 2, seed=0, n_sources=18,
                                     batch_frac=0.0)
        assert accuracy(ds.labels_u, lab) == 1.0

    def test_sbm_runs_and_returns_valid_labels(self):
        ds = bipartite_sbm(n_u=60, n_v=40, n_edges=400, k=3, noise=0.1,
                           seed=2)
        lab = girvan_newman_baseline(ds, 3, seed=0, n_sources=32,
                                     max_rounds=30)
        assert len(lab) == 60
        assert lab.max() < 3
