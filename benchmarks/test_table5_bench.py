"""Benchmark backing Table 5 / Figure 7 (large datasets): wall-clock of
the HOPE family vs the surviving baselines (NMF, NRP) on a scaled-down
MAG stand-in — the paper's headline result is that only these finish."""
import pytest

from repro.baselines import BASELINES
from repro.synth_data import make_dataset
from repro.tables import run_our_method

SIZE_FACTOR = 0.1  # MAG-lite/10: ~10K x 2.8K vertices, ~300K edges


@pytest.fixture(scope="module")
def mag_lite():
    return make_dataset("MAG", seed=0, size_factor=SIZE_FACTOR)


@pytest.mark.parametrize("method", ["HOPE", "HOPE+ (FNEM)", "HOPE+ (SNEM)"])
def test_hope_family_mag(benchmark, spark, mag_lite, method):
    benchmark.pedantic(
        lambda: run_our_method(spark, mag_lite, method, seed=1),
        rounds=1, iterations=1, warmup_rounds=0,
    )


@pytest.mark.parametrize("name", ["NMF", "NRP"])
def test_survivor_baselines_mag(benchmark, mag_lite, name):
    fn = BASELINES[name][0]
    benchmark.pedantic(
        lambda: fn(mag_lite, mag_lite.k, seed=1),
        rounds=1, iterations=1, warmup_rounds=0,
    )
