"""Clustering metrics (Acc/F1/NMI/ARI) against hand-computed values and
their standard invariants."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.metrics import accuracy, all_metrics, ari, best_matching, f1_score, nmi


T = np.array([0, 0, 0, 1, 1, 1, 2, 2, 2])


class TestPerfect:
    def test_acc_identical(self):
        assert accuracy(T, T) == 1.0

    def test_acc_permuted_labels(self):
        perm = np.array([2, 0, 1])[T]
        assert accuracy(T, perm) == 1.0

    def test_f1_identical(self):
        assert f1_score(T, T) == 1.0

    def test_nmi_identical(self):
        assert nmi(T, T) == pytest.approx(1.0)

    def test_ari_identical(self):
        assert ari(T, T) == pytest.approx(1.0)

    def test_all_metrics_keys(self):
        m = all_metrics(T, T)
        assert set(m) == {"acc", "f1", "nmi", "ari"}


class TestKnownValues:
    def test_acc_one_wrong(self):
        pred = T.copy()
        pred[0] = 1
        assert accuracy(T, pred) == pytest.approx(8 / 9)

    def test_acc_single_cluster_prediction(self):
        pred = np.zeros_like(T)
        assert accuracy(T, pred) == pytest.approx(3 / 9)

    def test_nmi_single_cluster_is_zero(self):
        pred = np.zeros_like(T)
        assert nmi(T, pred) == 0.0

    def test_ari_single_cluster_is_zero(self):
        pred = np.zeros_like(T)
        assert ari(T, pred) == pytest.approx(0.0)

    def test_ari_hand_example(self):
        # Classic example: true [0,0,1,1], pred [0,1,1,1].
        t = np.array([0, 0, 1, 1])
        p = np.array([0, 1, 1, 1])
        # contingency [[1,1],[0,2]]; sum comb2 = 1; rows=2, cols=3, total=6
        # ARI = (1 - 2*3/6) / ((2+3)/2 - 2*3/6) = 0/1.5 = 0
        assert ari(t, p) == pytest.approx(0.0)

    def test_f1_half(self):
        t = np.array([0, 0, 1, 1])
        p = np.array([0, 1, 0, 1])
        # best matching is arbitrary: every cluster 50/50 -> F1 = 0.5
        assert f1_score(t, p) == pytest.approx(0.5)

    def test_best_matching_maps_clusters(self):
        pred = np.array([1, 1, 1, 2, 2, 2, 0, 0, 0])
        m = best_matching(T, pred)
        assert m == {1: 0, 2: 1, 0: 2}


class TestInvariance:
    def test_acc_invariant_to_pred_relabeling(self):
        rng = np.random.default_rng(0)
        t = rng.integers(0, 4, 60)
        p = rng.integers(0, 4, 60)
        perm = np.array([3, 2, 0, 1])
        assert accuracy(t, p) == pytest.approx(accuracy(t, perm[p]))

    def test_nmi_symmetric(self):
        rng = np.random.default_rng(1)
        t = rng.integers(0, 3, 50)
        p = rng.integers(0, 5, 50)
        assert nmi(t, p) == pytest.approx(nmi(p, t))

    def test_ari_symmetric(self):
        rng = np.random.default_rng(2)
        t = rng.integers(0, 3, 50)
        p = rng.integers(0, 5, 50)
        assert ari(t, p) == pytest.approx(ari(p, t))

    def test_acc_with_noncontiguous_labels(self):
        t = np.array([10, 10, 42, 42])
        p = np.array([7, 7, 3, 3])
        assert accuracy(t, p) == 1.0

    def test_length_mismatch_raises(self):
        with pytest.raises(ValueError):
            accuracy(np.array([0, 1]), np.array([0, 1, 2]))


class TestRanges:
    @settings(max_examples=50, deadline=None)
    @given(seed=st.integers(0, 10_000), n=st.integers(5, 80),
           kt=st.integers(1, 5), kp=st.integers(1, 5))
    def test_all_metrics_in_range(self, seed, n, kt, kp):
        rng = np.random.default_rng(seed)
        t = rng.integers(0, kt, n)
        p = rng.integers(0, kp, n)
        m = all_metrics(t, p)
        assert 0.0 <= m["acc"] <= 1.0
        assert 0.0 <= m["f1"] <= 1.0
        assert 0.0 <= m["nmi"] <= 1.0
        assert -0.5 <= m["ari"] <= 1.0

    def test_random_labels_have_low_ari(self):
        rng = np.random.default_rng(3)
        t = rng.integers(0, 3, 3000)
        p = rng.integers(0, 3, 3000)
        assert abs(ari(t, p)) < 0.05

    def test_random_labels_have_low_nmi(self):
        rng = np.random.default_rng(4)
        t = rng.integers(0, 3, 3000)
        p = rng.integers(0, 3, 3000)
        assert nmi(t, p) < 0.05
