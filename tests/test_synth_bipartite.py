"""Synthetic bipartite DC-SBM generator: shapes, determinism, planted
structure and the Table-2 registry."""
import numpy as np
import pytest

from repro.synth_data import (
    LARGE_DATASETS,
    SMALL_DATASETS,
    TABLE2_SPECS,
    bipartite_sbm,
    make_dataset,
)


class TestGeneratorBasics:
    def test_shapes(self):
        ds = bipartite_sbm(n_u=100, n_v=80, n_edges=500, k=4, seed=0)
        assert ds.n_u == 100 and ds.n_v == 80
        assert set(ds.edges.columns) == {"u", "v", "w"}
        assert len(ds.labels_u) == 100 and len(ds.labels_v) == 80

    def test_edge_count_close_to_requested(self):
        ds = bipartite_sbm(n_u=200, n_v=150, n_edges=2000, k=3, seed=1)
        # duplicates merge, so <= requested and within a sane band
        assert 0.5 * 2000 <= ds.n_edges <= 2000

    def test_ids_in_range(self):
        ds = bipartite_sbm(n_u=50, n_v=40, n_edges=400, k=2, seed=2)
        assert ds.edges["u"].between(0, 49).all()
        assert ds.edges["v"].between(0, 39).all()

    def test_labels_in_range(self):
        ds = bipartite_sbm(n_u=60, n_v=30, n_edges=300, k=5, seed=3)
        assert set(np.unique(ds.labels_u)) <= set(range(5))
        assert set(np.unique(ds.labels_v)) <= set(range(5))

    def test_balanced_clusters(self):
        ds = bipartite_sbm(n_u=100, n_v=50, n_edges=400, k=4, seed=4)
        counts = np.bincount(ds.labels_u, minlength=4)
        assert counts.min() >= 20  # ~25 each

    def test_deterministic_in_seed(self):
        a = bipartite_sbm(n_u=80, n_v=60, n_edges=500, k=3, seed=7)
        b = bipartite_sbm(n_u=80, n_v=60, n_edges=500, k=3, seed=7)
        assert a.edges.equals(b.edges)
        np.testing.assert_array_equal(a.labels_u, b.labels_u)

    def test_different_seeds_differ(self):
        a = bipartite_sbm(n_u=80, n_v=60, n_edges=500, k=3, seed=7)
        b = bipartite_sbm(n_u=80, n_v=60, n_edges=500, k=3, seed=8)
        assert not a.edges.equals(b.edges)

    def test_unweighted_weights_after_merge_are_integral(self):
        ds = bipartite_sbm(n_u=50, n_v=40, n_edges=600, k=2, seed=5)
        assert (ds.edges["w"] == ds.edges["w"].round()).all()
        assert (ds.edges["w"] >= 1).all()

    def test_weighted_has_varied_weights(self):
        ds = bipartite_sbm(n_u=50, n_v=40, n_edges=600, k=2, seed=5,
                           weighted=True)
        assert ds.edges["w"].nunique() > 1

    def test_no_duplicate_pairs(self):
        ds = bipartite_sbm(n_u=50, n_v=40, n_edges=600, k=2, seed=6)
        assert not ds.edges.duplicated(["u", "v"]).any()


class TestPlantedStructure:
    def test_intra_cluster_edges_dominate_at_low_noise(self):
        ds = bipartite_sbm(n_u=200, n_v=200, n_edges=3000, k=4, noise=0.1,
                           seed=0)
        same = (ds.labels_u[ds.edges["u"]] == ds.labels_v[ds.edges["v"]])
        assert same.mean() > 0.7

    def test_noise_one_destroys_structure(self):
        ds = bipartite_sbm(n_u=200, n_v=200, n_edges=3000, k=4, noise=1.0,
                           seed=0)
        same = (ds.labels_u[ds.edges["u"]] == ds.labels_v[ds.edges["v"]])
        assert 0.15 < same.mean() < 0.4  # ~1/k

    def test_hub_vertices_touch_many_clusters(self):
        ds = bipartite_sbm(n_u=300, n_v=100, n_edges=5000, k=4, noise=0.0,
                           hub_fraction=0.05, seed=0)
        e = ds.edges
        deg_v = e.groupby("v")["w"].count()
        hubs = deg_v.nlargest(3).index.to_numpy()
        for h in hubs:
            touched = np.unique(ds.labels_u[e.loc[e["v"] == h, "u"]])
            assert len(touched) >= 3  # spans most clusters

    def test_degree_skew(self):
        ds = bipartite_sbm(n_u=500, n_v=400, n_edges=8000, k=4, seed=1)
        deg = ds.edges.groupby("u")["w"].sum()
        assert deg.max() > 4 * deg.median()


class TestRegistry:
    def test_registry_has_ten_datasets(self):
        assert len(TABLE2_SPECS) == 10
        assert set(SMALL_DATASETS + LARGE_DATASETS) == set(TABLE2_SPECS)

    @pytest.mark.parametrize("name", SMALL_DATASETS + LARGE_DATASETS)
    def test_make_dataset_tiny(self, name):
        ds = make_dataset(name, seed=0, size_factor=0.02)
        spec = TABLE2_SPECS[name]
        assert ds.k == spec["k"]
        assert ds.n_u <= spec["n_u"]
        assert ds.n_edges > 0

    def test_size_factor_scales(self):
        small = make_dataset("CORA", size_factor=0.05)
        full = make_dataset("CORA", size_factor=0.5)
        assert small.n_u < full.n_u
        assert small.n_edges < full.n_edges

    def test_weighted_flag_respected(self):
        pub = make_dataset("PubMed", size_factor=0.05)
        assert pub.edges["w"].nunique() > 1

    def test_to_spark_roundtrip(self, spark):
        ds = make_dataset("CORA", size_factor=0.02)
        df = ds.to_spark(spark)
        assert df.count() == ds.n_edges
        assert set(df.columns) == {"u", "v", "w"}
