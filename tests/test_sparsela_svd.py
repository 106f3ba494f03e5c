"""Randomized SVD / eigensolvers against exact numpy decompositions."""
import numpy as np
import pytest

from repro.sparsela import SparseCOO, eigsh_sym, lloyd, matfree_eigsh, randomized_svd


def random_sparse(rng, n, m, nnz):
    return SparseCOO.from_edges(
        rng.integers(0, n, nnz), rng.integers(0, m, nnz),
        rng.standard_normal(nnz), n, m)


class TestRandomizedSVD:
    def test_singular_values_match_dense(self):
        rng = np.random.default_rng(0)
        a = random_sparse(rng, 30, 20, 200)
        _, s, _ = randomized_svd(a, 5, seed=1)
        s_exact = np.linalg.svd(a.to_dense(), compute_uv=False)
        np.testing.assert_allclose(s, s_exact[:5], rtol=1e-6)

    def test_left_vectors_orthonormal(self):
        rng = np.random.default_rng(1)
        a = random_sparse(rng, 25, 15, 100)
        U, _, _ = randomized_svd(a, 4, seed=2)
        np.testing.assert_allclose(U.T @ U, np.eye(4), atol=1e-8)

    def test_reconstruction_quality(self):
        rng = np.random.default_rng(2)
        # Build an exactly rank-3 matrix.
        L = rng.standard_normal((20, 3))
        R = rng.standard_normal((3, 10))
        dense = L @ R
        rows, cols = np.nonzero(dense)
        a = SparseCOO.from_edges(rows, cols, dense[rows, cols], 20, 10)
        U, s, Vt = randomized_svd(a, 3, seed=3)
        np.testing.assert_allclose((U * s) @ Vt, dense, atol=1e-8)

    def test_subspace_agreement(self):
        rng = np.random.default_rng(3)
        a = random_sparse(rng, 40, 30, 400)
        U, _, _ = randomized_svd(a, 3, seed=4)
        Ue, se, _ = np.linalg.svd(a.to_dense())
        # Principal angles between the two 3-dim subspaces ~ 0.
        overlap = np.linalg.svd(U.T @ Ue[:, :3], compute_uv=False)
        np.testing.assert_allclose(overlap, np.ones(3), atol=1e-4)

    def test_rank_clamped_to_min_dim(self):
        rng = np.random.default_rng(4)
        a = random_sparse(rng, 10, 3, 20)
        U, s, Vt = randomized_svd(a, 3, seed=5)
        assert U.shape == (10, 3) and len(s) == 3 and Vt.shape == (3, 3)


class TestEigsh:
    def test_matches_dense_eigh_psd(self):
        rng = np.random.default_rng(5)
        B = rng.standard_normal((15, 8))
        dense = B @ B.T  # PSD
        rows, cols = np.nonzero(dense)
        a = SparseCOO.from_edges(rows, cols, dense[rows, cols], 15, 15)
        w, V = eigsh_sym(a, 4, seed=6)
        w_exact = np.linalg.eigvalsh(dense)[::-1]
        np.testing.assert_allclose(w, w_exact[:4], rtol=1e-5)
        np.testing.assert_allclose(V.T @ V, np.eye(4), atol=1e-6)

    def test_eigvector_residual(self):
        rng = np.random.default_rng(6)
        B = rng.standard_normal((12, 12))
        dense = B @ B.T
        rows, cols = np.nonzero(dense)
        a = SparseCOO.from_edges(rows, cols, dense[rows, cols], 12, 12)
        w, V = eigsh_sym(a, 2, seed=7)
        for i in range(2):
            res = dense @ V[:, i] - w[i] * V[:, i]
            assert np.linalg.norm(res) < 1e-4 * max(w[0], 1.0)

    def test_matfree_matches_eigsh(self):
        rng = np.random.default_rng(7)
        B = rng.standard_normal((10, 10))
        dense = B @ B.T

        w, V = matfree_eigsh(lambda x: dense @ x, 10, 3, seed=8)
        w_exact = np.linalg.eigvalsh(dense)[::-1]
        np.testing.assert_allclose(w, w_exact[:3], rtol=1e-5)


class TestLloyd:
    def test_separated_blobs(self):
        rng = np.random.default_rng(8)
        X = np.vstack([rng.normal(0, 0.05, (30, 2)),
                       rng.normal(5, 0.05, (30, 2)),
                       rng.normal(-5, 0.05, (30, 2))])
        lab = lloyd(X, 3, seed=0)
        # Each blob should be a single pure cluster.
        for blk in range(3):
            seg = lab[blk * 30:(blk + 1) * 30]
            assert len(np.unique(seg)) == 1
        assert len(np.unique(lab)) == 3

    def test_k_geq_n(self):
        X = np.zeros((3, 2))
        lab = lloyd(X, 5, seed=0)
        assert len(lab) == 3

    def test_weighted_centroids(self):
        # A heavy point drags its cluster's centroid; the result must
        # still partition into 2 groups.
        X = np.array([[0.0], [0.1], [10.0], [10.1]])
        lab = lloyd(X, 2, seed=0, weights=np.array([100.0, 1, 1, 1]))
        assert lab[0] == lab[1] and lab[2] == lab[3] and lab[0] != lab[2]

    def test_deterministic_for_seed(self):
        rng = np.random.default_rng(9)
        X = rng.random((50, 4))
        np.testing.assert_array_equal(lloyd(X, 3, seed=5), lloyd(X, 3, seed=5))
