"""Numerical verification of the rounding lemmas (4.4 and 4.5) and the
behaviour of Algorithm 3 in its numpy reference form."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.hopeplus import fnem_update, snem_update
from repro.core.reference import rounding_ref


def random_orthogonal(rng, k):
    q, _ = np.linalg.qr(rng.standard_normal((k, k)))
    return q


def make_lc(seed, n=40, k=3):
    rng = np.random.default_rng(seed)
    L, _ = np.linalg.qr(rng.standard_normal((n, k)))
    labels = rng.integers(0, k, n)
    C = np.zeros((n, k))
    C[np.arange(n), labels] = 1.0
    C /= np.maximum(np.sqrt(C.sum(axis=0)), 1.0)[None, :]
    return rng, L, C


class TestLemma44Procrustes:
    @settings(max_examples=25, deadline=None)
    @given(seed=st.integers(0, 5000))
    def test_fnem_t_beats_random_rotations(self, seed):
        rng, L, C = make_lc(seed)
        T_star = fnem_update(L.T @ C)
        best = np.linalg.norm(L @ T_star - C, "fro")
        for _ in range(20):
            T = random_orthogonal(rng, 3)
            assert best <= np.linalg.norm(L @ T - C, "fro") + 1e-9

    def test_fnem_t_is_orthogonal(self):
        _, L, C = make_lc(0)
        T = fnem_update(L.T @ C)
        np.testing.assert_allclose(T @ T.T, np.eye(3), atol=1e-10)

    def test_fnem_exact_recovery(self):
        # If C = L R for an orthogonal R, Procrustes must find it.
        rng = np.random.default_rng(1)
        L, _ = np.linalg.qr(rng.standard_normal((30, 3)))
        R = random_orthogonal(rng, 3)
        T = fnem_update(L.T @ (L @ R))
        np.testing.assert_allclose(T, R, atol=1e-10)


class TestLemma45Snem:
    def test_snem_t_formula(self):
        _, L, C = make_lc(2)
        np.testing.assert_allclose(snem_update(L.T @ C), L.T @ C)

    @settings(max_examples=25, deadline=None)
    @given(seed=st.integers(0, 5000))
    def test_snem_t_minimises_spectral_norm(self, seed):
        # Lemma 4.5: T* = L^T C minimises ||L T - C||_2 over all T
        # (unconstrained minimiser = projection onto span(L)).
        rng, L, C = make_lc(seed)
        T_star = L.T @ C
        best = np.linalg.norm(L @ T_star - C, 2)
        for _ in range(20):
            T = T_star + 0.3 * rng.standard_normal(T_star.shape)
            assert best <= np.linalg.norm(L @ T - C, 2) + 1e-9


class TestRoundingBehaviour:
    def test_converges_on_wellseparated(self):
        # Three orthogonal direction bundles -> rounding is stable and
        # perfectly recovers the groups.
        rng = np.random.default_rng(3)
        base = np.eye(3)
        labels = np.repeat([0, 1, 2], 20)
        L = base[labels] + 0.01 * rng.standard_normal((60, 3))
        for urt in ("snem", "fnem"):
            got = rounding_ref(L, 3, urt=urt)
            # perfect grouping up to label permutation
            for g in range(3):
                seg = got[labels == g]
                assert len(np.unique(seg)) == 1
            assert len(np.unique(got)) == 3

    def test_trace_objective_not_degraded(self):
        # Rounding should not leave the VCMI trace objective below the
        # naive argmax seeding's value.
        rng = np.random.default_rng(4)
        L, _ = np.linalg.qr(rng.standard_normal((50, 4)))

        def trace_obj(labels):
            C = np.zeros((50, 4))
            C[np.arange(50), labels] = 1.0
            C /= np.maximum(np.sqrt(C.sum(axis=0)), 1.0)[None, :]
            M = L.T @ C
            return np.trace(M @ M.T)  # Tr(C^T LL^T C)

        seed_labels = L.argmax(axis=1)
        for urt in ("snem", "fnem"):
            got = rounding_ref(L, 4, urt=urt)
            assert trace_obj(got) >= trace_obj(seed_labels) - 1e-9

    def test_handles_empty_cluster(self):
        # All rows pointing at the same corner: rounding must not crash.
        L = np.tile(np.array([[1.0, 0.0]]), (10, 1))
        got = rounding_ref(L, 2, urt="snem")
        assert len(got) == 10

    def test_max_iterations_respected(self):
        rng = np.random.default_rng(5)
        L = rng.standard_normal((30, 3))
        got = rounding_ref(L, 3, urt="snem", t_max=1)
        assert len(got) == 30
