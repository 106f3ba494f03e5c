"""Benchmark backing Table 4 / Figure 7 (small datasets): wall-clock of
the three HOPE-family methods and the two strongest baselines on the
CORA stand-in at bench scale."""
import pytest

from repro.baselines import BASELINES
from repro.synth_data import make_dataset
from repro.tables import run_our_method

SIZE_FACTOR = 0.5  # ~CORA/2 keeps the full bench suite under a few minutes


@pytest.fixture(scope="module")
def cora():
    return make_dataset("CORA", seed=0, size_factor=SIZE_FACTOR)


@pytest.mark.parametrize("method", ["HOPE", "HOPE+ (FNEM)", "HOPE+ (SNEM)"])
def test_hope_family_cora(benchmark, spark, cora, method):
    benchmark.pedantic(
        lambda: run_our_method(spark, cora, method, seed=1),
        rounds=1, iterations=1, warmup_rounds=0,
    )


@pytest.mark.parametrize("name", ["NMF", "BiSBM-MCMC"])
def test_baselines_cora(benchmark, cora, name):
    fn = BASELINES[name][0]
    benchmark.pedantic(
        lambda: fn(cora, cora.k, seed=1),
        rounds=1, iterations=1, warmup_rounds=0,
    )
