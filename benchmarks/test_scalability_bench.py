"""Benchmark backing Figure 8 (scalability): HOPE+ (SNEM) runtime as
|E|, |U|+|V| and k grow on Erdős–Rényi-style random bipartite graphs.

The paper's observation to reproduce: runtime grows roughly with the
number of vertices and with k, but only modestly with the number of
edges."""
import pytest

from repro.synth_data import bipartite_sbm
from repro.tables import run_our_method


def _random_graph(n_total: int, n_edges: int, k: int):
    # noise=1.0 -> uniform endpoints, i.e. the Erdős–Rényi regime.
    return bipartite_sbm(n_u=n_total // 2, n_v=n_total // 2,
                         n_edges=n_edges, k=k, noise=1.0, seed=0)


@pytest.mark.parametrize("n_edges", [50_000, 100_000, 200_000])
def test_vary_edges(benchmark, spark, n_edges):
    ds = _random_graph(20_000, n_edges, 10)
    benchmark.pedantic(
        lambda: run_our_method(spark, ds, "HOPE+ (SNEM)", seed=1),
        rounds=1, iterations=1, warmup_rounds=0,
    )


@pytest.mark.parametrize("n_total", [10_000, 20_000, 40_000])
def test_vary_vertices(benchmark, spark, n_total):
    ds = _random_graph(n_total, 100_000, 10)
    benchmark.pedantic(
        lambda: run_our_method(spark, ds, "HOPE+ (SNEM)", seed=1),
        rounds=1, iterations=1, warmup_rounds=0,
    )


@pytest.mark.parametrize("k", [2, 10, 25])
def test_vary_k(benchmark, spark, k):
    ds = _random_graph(10_000, 100_000, k)
    benchmark.pedantic(
        lambda: run_our_method(spark, ds, "HOPE+ (SNEM)", seed=1),
        rounds=1, iterations=1, warmup_rounds=0,
    )
