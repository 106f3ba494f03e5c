"""Distributed HOPE+ (Algorithms 2-3) end-to-end, VCMI invariants, and
agreement with the numpy reference."""
import numpy as np
import pandas as pd
import pytest

from repro.core.hope import hop_embedding
from repro.core.hopeplus import hopeplus, truncated_svd_of_skinny
from repro.core.reference import build_pq, hopeplus_ref
from repro.metrics import accuracy, nmi
from repro.synth_data import bipartite_sbm
from repro.tables import labels_from_assignment


@pytest.fixture(scope="module")
def planted(spark):
    ds = bipartite_sbm(n_u=200, n_v=150, n_edges=2500, k=3, noise=0.1, seed=9)
    return ds, ds.to_spark(spark).cache()


class TestStage1:
    def test_l_has_orthonormal_columns(self, spark, planted):
        ds, edges = planted
        X, _ = hop_embedding(edges, alpha=0.3, beta=12, seed=1)
        L, s = truncated_svd_of_skinny(X, 12, ds.k)
        pdf = L.toPandas()
        M = np.vstack(pdf["vec"].to_numpy())
        np.testing.assert_allclose(M.T @ M, np.eye(ds.k), atol=1e-6)

    def test_singular_values_descending(self, spark, planted):
        ds, edges = planted
        X, _ = hop_embedding(edges, alpha=0.3, beta=12, seed=1)
        _, s = truncated_svd_of_skinny(X, 12, ds.k)
        assert (np.diff(s) <= 1e-9).all()

    def test_leading_column_oriented_positive(self, spark, planted):
        ds, edges = planted
        X, _ = hop_embedding(edges, alpha=0.3, beta=12, seed=1)
        L, _ = truncated_svd_of_skinny(X, 12, ds.k)
        M = np.vstack(L.toPandas()["vec"].to_numpy())
        # Perron-like leading eigenvector of X X^T: non-negative after the
        # sign fix.
        assert M[:, 0].sum() > 0


class TestHopePlusEndToEnd:
    @pytest.mark.parametrize("urt", ["snem", "fnem"])
    def test_recovers_planted_clusters(self, spark, planted, urt):
        ds, edges = planted
        assign = hopeplus(edges, ds.k, beta=12, urt=urt, seed=1)
        lab = labels_from_assignment(assign, ds.n_u)
        assert accuracy(ds.labels_u, lab) > 0.9

    def test_invalid_urt_raises(self, spark, planted):
        ds, edges = planted
        with pytest.raises(ValueError):
            hopeplus(edges, ds.k, urt="nope")

    def test_output_is_valid_vcmi_assignment(self, spark, planted):
        # Every u gets exactly one cluster in 0..k-1 (the VCMI row
        # constraint of Eq. 10).
        ds, edges = planted
        assign = hopeplus(edges, ds.k, beta=12, urt="snem", seed=1).toPandas()
        assert assign["id"].is_unique
        assert assign["cluster"].between(0, ds.k - 1).all()
        assert len(assign) == len(np.unique(ds.edges["u"]))

    def test_agrees_with_reference(self, spark, planted):
        # Same pipeline in numpy and Spark should land on near-identical
        # partitions (randomized SVD bases differ, partitions align).
        ds, edges = planted
        P, Q = build_pq(ds.edges["u"].to_numpy(), ds.edges["v"].to_numpy(),
                        ds.edges["w"].to_numpy(), ds.n_u, ds.n_v)
        lab_ref = hopeplus_ref(P, Q, ds.k, beta=12, urt="snem", seed=1)
        assign = hopeplus(edges, ds.k, beta=12, urt="snem", seed=1)
        lab = labels_from_assignment(assign, ds.n_u)
        assert nmi(lab_ref, lab) > 0.8

    def test_weighted_graph(self, spark):
        ds = bipartite_sbm(n_u=150, n_v=100, n_edges=2000, k=3, noise=0.1,
                           seed=13, weighted=True)
        assign = hopeplus(ds.to_spark(spark), 3, beta=9, urt="snem", seed=1)
        lab = labels_from_assignment(assign, ds.n_u)
        assert accuracy(ds.labels_u, lab) > 0.85

    def test_k2_smallest_case(self, spark):
        ds = bipartite_sbm(n_u=80, n_v=60, n_edges=800, k=2, noise=0.1,
                           seed=21)
        for urt in ("snem", "fnem"):
            assign = hopeplus(ds.to_spark(spark), 2, beta=6, urt=urt, seed=1)
            lab = labels_from_assignment(assign, ds.n_u)
            assert accuracy(ds.labels_u, lab) > 0.9

    def test_t_max_one_still_valid(self, spark, planted):
        ds, edges = planted
        assign = hopeplus(edges, ds.k, beta=12, urt="snem", seed=1, t_max=1)
        lab = labels_from_assignment(assign, ds.n_u)
        assert len(np.unique(lab)) <= ds.k
