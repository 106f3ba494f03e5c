"""Distributed skinny-matrix linear algebra over Spark DataFrames."""
from .skinny import (
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

__all__ = [
    "cross_gram",
    "fill_missing",
    "gram",
    "matmul_small",
    "orthonormalize",
    "random_skinny",
    "row_normalize",
    "spgemm",
    "svd_topk",
]
