"""Distributed skinny-matrix ops vs exact numpy, plus DuckDB-oracle
checks of the spgemm join-aggregate."""
import numpy as np
import pandas as pd
import pyspark.sql.functions as F
import pytest

from repro.linalg import (
    cross_gram,
    fill_missing,
    gram,
    matmul_small,
    orthonormalize,
    random_skinny,
    row_normalize,
    spgemm,
    svd_topk,
)
from repro.linalg.skinny import colwise_maxabs_value
from repro.oracle import assert_equivalent
from repro.sparsela import SparseCOO


def make_skinny(spark, M: np.ndarray):
    return spark.createDataFrame(
        pd.DataFrame({"id": np.arange(M.shape[0]), "vec": list(M)})
    )


def collect_skinny(df, n: int, r: int) -> np.ndarray:
    pdf = df.toPandas()
    out = np.zeros((n, r))
    out[pdf["id"].to_numpy()] = np.vstack(pdf["vec"].to_numpy())
    return out


@pytest.fixture(scope="module")
def sparse_case(spark):
    rng = np.random.default_rng(0)
    n, m, nnz = 25, 18, 120
    rows = rng.integers(0, n, nnz)
    cols = rng.integers(0, m, nnz)
    vals = rng.standard_normal(nnz)
    coo = SparseCOO.from_edges(rows, cols, vals, n, m)
    edges = spark.createDataFrame(
        pd.DataFrame({"r": coo.rows, "c": coo.cols, "v": coo.data})
    ).cache()
    return edges, coo


class TestSpgemm:
    def test_matches_dense(self, spark, sparse_case):
        edges, coo = sparse_case
        rng = np.random.default_rng(1)
        S = rng.standard_normal((coo.shape[1], 4))
        got = collect_skinny(spgemm(edges, make_skinny(spark, S)),
                             coo.shape[0], 4)
        np.testing.assert_allclose(got, coo.to_dense() @ S, atol=1e-10)

    def test_oracle_single_column(self, spark, sparse_case):
        # The spgemm join-aggregate, checked against DuckDB SQL on one
        # column (arrays are not orderable in the oracle, scalars are).
        edges, coo = sparse_case
        rng = np.random.default_rng(2)
        S = rng.standard_normal((coo.shape[1], 3))
        out = spgemm(edges, make_skinny(spark, S))
        got = out.select("id", F.element_at("vec", 1).alias("y"))
        svec = pd.DataFrame({"c": np.arange(coo.shape[1]), "x": S[:, 0]})
        assert_equivalent(
            got,
            """
            SELECT e.r AS id, SUM(e.v * s.x) AS y
            FROM edges e JOIN svec s ON e.c = s.c
            GROUP BY e.r
            """,
            edges=edges,
            svec=svec,
        )

    def test_drops_empty_rows(self, spark):
        edges = spark.createDataFrame(
            pd.DataFrame({"r": [0, 2], "c": [0, 1], "v": [1.0, 2.0]})
        )
        S = np.ones((2, 2))
        out = spgemm(edges, make_skinny(spark, S)).toPandas()
        assert set(out["id"]) == {0, 2}

    def test_fill_missing_restores_rows(self, spark):
        edges = spark.createDataFrame(
            pd.DataFrame({"r": [0, 2], "c": [0, 1], "v": [1.0, 2.0]})
        )
        ids = spark.range(4).withColumnRenamed("id", "id")
        out = spgemm(edges, make_skinny(spark, np.ones((2, 2))))
        full = collect_skinny(fill_missing(ids, out, 2), 4, 2)
        np.testing.assert_allclose(full[1], 0.0)
        np.testing.assert_allclose(full[3], 0.0)
        np.testing.assert_allclose(full[0], [1.0, 1.0])


class TestGram:
    def test_gram_matches_dense(self, spark):
        rng = np.random.default_rng(3)
        M = rng.standard_normal((40, 5))
        got = gram(make_skinny(spark, M), 5)
        np.testing.assert_allclose(got, M.T @ M, atol=1e-10)

    def test_gram_empty(self, spark):
        empty = spark.createDataFrame([], "id bigint, vec array<double>")
        np.testing.assert_allclose(gram(empty, 3), np.zeros((3, 3)))

    def test_cross_gram_matches_dense(self, spark):
        rng = np.random.default_rng(4)
        A = rng.standard_normal((30, 4))
        B = rng.standard_normal((30, 6))
        got = cross_gram(make_skinny(spark, A), make_skinny(spark, B), 4, 6)
        np.testing.assert_allclose(got, A.T @ B, atol=1e-10)


class TestSmallOps:
    def test_matmul_small(self, spark):
        rng = np.random.default_rng(5)
        M = rng.standard_normal((20, 3))
        S = rng.standard_normal((3, 7))
        got = collect_skinny(matmul_small(make_skinny(spark, M), S), 20, 7)
        np.testing.assert_allclose(got, M @ S, atol=1e-12)

    def test_row_normalize(self, spark):
        rng = np.random.default_rng(6)
        M = rng.standard_normal((15, 4))
        got = collect_skinny(row_normalize(make_skinny(spark, M)), 15, 4)
        np.testing.assert_allclose(np.linalg.norm(got, axis=1), 1.0,
                                   atol=1e-12)

    def test_row_normalize_zero_row(self, spark):
        M = np.array([[0.0, 0.0], [3.0, 4.0]])
        got = collect_skinny(row_normalize(make_skinny(spark, M)), 2, 2)
        np.testing.assert_allclose(got[0], 0.0)
        np.testing.assert_allclose(got[1], [0.6, 0.8])

    def test_colwise_maxabs_value(self, spark):
        M = np.array([[1.0, -5.0], [-2.0, 3.0], [0.5, 4.0]])
        got = colwise_maxabs_value(make_skinny(spark, M), 2)
        np.testing.assert_allclose(got, [-2.0, -5.0])

    def test_random_skinny_deterministic(self, spark):
        ids = spark.range(10)
        a = collect_skinny(random_skinny(spark, ids, 4, seed=9), 10, 4)
        b = collect_skinny(random_skinny(spark, ids, 4, seed=9), 10, 4)
        np.testing.assert_array_equal(a, b)
        c = collect_skinny(random_skinny(spark, ids, 4, seed=10), 10, 4)
        assert not np.allclose(a, c)

    def test_random_skinny_in_range(self, spark):
        ids = spark.range(50)
        M = collect_skinny(random_skinny(spark, ids, 6, seed=1), 50, 6)
        assert np.abs(M).max() <= 1.0


class TestOrthonormalize:
    def test_orthonormal_columns(self, spark):
        rng = np.random.default_rng(7)
        M = rng.standard_normal((30, 5))
        Q = collect_skinny(orthonormalize(make_skinny(spark, M), 5), 30, 5)
        np.testing.assert_allclose(Q.T @ Q, np.eye(5), atol=1e-8)

    def test_preserves_column_space(self, spark):
        rng = np.random.default_rng(8)
        M = rng.standard_normal((20, 3))
        Q = collect_skinny(orthonormalize(make_skinny(spark, M), 3), 20, 3)
        # Projection of M onto span(Q) equals M.
        np.testing.assert_allclose(Q @ (Q.T @ M), M, atol=1e-8)


class TestSvdTopk:
    def test_matches_numpy_svd(self, spark, sparse_case):
        edges, coo = sparse_case
        row_ids = spark.createDataFrame(
            pd.DataFrame({"r": np.arange(coo.shape[0])}))
        col_ids = spark.createDataFrame(
            pd.DataFrame({"c": np.arange(coo.shape[1])}))
        U, s = svd_topk(edges, row_ids, col_ids, 4, seed=3)
        s_exact = np.linalg.svd(coo.to_dense(), compute_uv=False)
        np.testing.assert_allclose(s, s_exact[:4], rtol=1e-5)
        Ud = collect_skinny(U, coo.shape[0], 4)
        # subspace agreement with exact left singular vectors
        Ue = np.linalg.svd(coo.to_dense())[0][:, :4]
        overlap = np.linalg.svd(Ud.T @ Ue, compute_uv=False)
        np.testing.assert_allclose(overlap, 1.0, atol=1e-3)

    def test_rank_clamped(self, spark):
        edges = spark.createDataFrame(
            pd.DataFrame({"r": [0, 1, 2], "c": [0, 1, 0], "v": [1.0, 2.0, 3.0]}))
        row_ids = spark.range(3).select(F.col("id").alias("r"))
        col_ids = spark.range(2).select(F.col("id").alias("c"))
        U, s = svd_topk(edges, row_ids, col_ids, 10, seed=0)
        assert len(s) == 2
