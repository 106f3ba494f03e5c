"""Hungarian assignment solver vs brute force and invariants."""
import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.metrics import linear_sum_assignment


def brute_force_min(cost: np.ndarray) -> float:
    n, m = cost.shape
    assert n <= m
    best = np.inf
    for perm in itertools.permutations(range(m), n):
        best = min(best, sum(cost[i, p] for i, p in enumerate(perm)))
    return best


class TestSmallExact:
    def test_identity_cost(self):
        rows, cols = linear_sum_assignment(np.eye(3))
        assert np.eye(3)[rows, cols].sum() == 0.0

    def test_simple_2x2(self):
        cost = np.array([[4.0, 1.0], [2.0, 8.0]])
        rows, cols = linear_sum_assignment(cost)
        assert cost[rows, cols].sum() == 3.0

    def test_3x3_known(self):
        cost = np.array([[4, 1, 3], [2, 0, 5], [3, 2, 2]], dtype=float)
        rows, cols = linear_sum_assignment(cost)
        assert cost[rows, cols].sum() == 5.0

    def test_negative_costs(self):
        cost = -np.array([[10, 1], [1, 10]], dtype=float)
        rows, cols = linear_sum_assignment(cost)
        assert cost[rows, cols].sum() == -20.0

    def test_rectangular_wide(self):
        cost = np.array([[9, 9, 1.0], [9, 1, 9.0]])
        rows, cols = linear_sum_assignment(cost)
        assert cost[rows, cols].sum() == 2.0
        assert len(rows) == 2

    def test_rectangular_tall(self):
        cost = np.array([[9, 1.0], [1, 9.0], [5, 5.0]])
        rows, cols = linear_sum_assignment(cost)
        assert len(rows) == 2
        assert cost[rows, cols].sum() == 2.0

    def test_ties_still_optimal(self):
        cost = np.ones((4, 4))
        rows, cols = linear_sum_assignment(cost)
        assert cost[rows, cols].sum() == 4.0
        assert len(set(cols)) == 4

    def test_1x1(self):
        rows, cols = linear_sum_assignment(np.array([[7.0]]))
        assert (rows.tolist(), cols.tolist()) == ([0], [0])

    def test_rejects_1d(self):
        with pytest.raises(ValueError):
            linear_sum_assignment(np.arange(4.0))


@settings(max_examples=60, deadline=None)
@given(
    n=st.integers(1, 5),
    m=st.integers(1, 5),
    seed=st.integers(0, 10_000),
)
def test_matches_brute_force(n, m, seed):
    rng = np.random.default_rng(seed)
    cost = rng.integers(-20, 20, size=(n, m)).astype(float)
    rows, cols = linear_sum_assignment(cost)
    got = cost[rows, cols].sum()
    want = brute_force_min(cost if n <= m else cost.T)
    assert got == pytest.approx(want)


@settings(max_examples=30, deadline=None)
@given(seed=st.integers(0, 10_000))
def test_assignment_is_valid_matching(seed):
    rng = np.random.default_rng(seed)
    cost = rng.random((6, 6))
    rows, cols = linear_sum_assignment(cost)
    assert len(rows) == 6
    assert sorted(rows.tolist()) == list(range(6))
    assert sorted(cols.tolist()) == list(range(6))
