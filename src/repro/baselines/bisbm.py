"""BiSBM baselines: degree-corrected bipartite stochastic block models.

Both optimise the degree-corrected bipartite SBM profile log-likelihood
(Larremore et al. [32], Yen & Larremore [67]):

    L = Σ_rs f(m_rs) − Σ_r f(κ^U_r) − Σ_s f(κ^V_s),   f(x) = x·ln x

where m_rs is the total edge weight between U-block r and V-block s and
κ are block degree sums.  Bipartite structure is enforced by assigning U
vertices only to U-blocks and V vertices only to V-blocks (k each).

* **BiSBM-KL** — Kernighan–Lin-style greedy sweeps: each vertex moves to
  the block with the best positive ΔL; repeat until a sweep makes no move.
* **BiSBM-MCMC** — Metropolis–Hastings single-vertex moves with a
  geometric annealing schedule, then a final greedy sweep (zero-
  temperature polish), mirroring the MCMC sampler's maximum-a-posteriori
  use in the paper's experiments.

Per-vertex move evaluation is O(k + deg) with numpy, so a sweep costs
O(|E| + (|U|+|V|)·k).
"""
from __future__ import annotations

import numpy as np

from ..synth_data import BipartiteDataset


def _f(x):
    """x ln x with f(0) = 0, elementwise."""
    x = np.asarray(x, dtype=np.float64)
    out = np.zeros_like(x)
    pos = x > 0
    out[pos] = x[pos] * np.log(x[pos])
    return out


class _State:
    """Mutable block-membership state with O(k²) sufficient statistics."""

    def __init__(self, ds: BipartiteDataset, k: int, rng: np.random.Generator):
        e = ds.edges
        self.k = k
        self.u = e["u"].to_numpy()
        self.v = e["v"].to_numpy()
        self.w = e["w"].to_numpy().astype(np.float64)
        self.n_u, self.n_v = ds.n_u, ds.n_v
        self.deg_u = np.bincount(self.u, weights=self.w, minlength=self.n_u)
        self.deg_v = np.bincount(self.v, weights=self.w, minlength=self.n_v)
        self.gu = rng.integers(0, k, self.n_u)
        self.gv = rng.integers(0, k, self.n_v)
        # incidence lists: for each u, the slice of its edges (CSR-style)
        self.u_order = np.argsort(self.u, kind="stable")
        self.u_ptr = np.searchsorted(self.u[self.u_order], np.arange(self.n_u + 1))
        self.v_order = np.argsort(self.v, kind="stable")
        self.v_ptr = np.searchsorted(self.v[self.v_order], np.arange(self.n_v + 1))
        self._rebuild()

    def _rebuild(self):
        self.m = np.zeros((self.k, self.k))
        np.add.at(self.m, (self.gu[self.u], self.gv[self.v]), self.w)
        self.ku = np.bincount(self.gu, weights=self.deg_u, minlength=self.k)
        self.kv = np.bincount(self.gv, weights=self.deg_v, minlength=self.k)

    def loglik(self) -> float:
        return float(_f(self.m).sum() - _f(self.ku).sum() - _f(self.kv).sum())

    # -- move evaluation ----------------------------------------------------
    def _edge_profile_u(self, i: int) -> np.ndarray:
        """e[s] = weight from u_i to V-block s."""
        sl = self.u_order[self.u_ptr[i]:self.u_ptr[i + 1]]
        return np.bincount(self.gv[self.v[sl]], weights=self.w[sl],
                           minlength=self.k)

    def _edge_profile_v(self, j: int) -> np.ndarray:
        sl = self.v_order[self.v_ptr[j]:self.v_ptr[j + 1]]
        return np.bincount(self.gu[self.u[sl]], weights=self.w[sl],
                           minlength=self.k)

    @staticmethod
    def _delta_generic(m_rows: np.ndarray, kappa: np.ndarray, r: int,
                       d: float, e: np.ndarray, k: int) -> np.ndarray:
        """ΔL of moving a vertex with degree ``d`` and block-edge profile
        ``e`` from block ``r`` to every candidate block (0 at ``r``).

        Δ(Σ f(m))   = Σ_s [f(m_{r,s}−e_s) − f(m_{r,s})]
                    + Σ_s [f(m_{r',s}+e_s) − f(m_{r',s})]      (r' ≠ r)
        Δ(−Σ f(κ))  = −[f(κ_r−d) − f(κ_r)] − [f(κ_{r'}+d) − f(κ_{r'})]
        Rows r and r' are disjoint for r' ≠ r so the two row updates
        commute and can be evaluated independently.
        """
        base_r = (_f(m_rows[r] - e) - _f(m_rows[r])).sum()
        gain = (_f(m_rows + e[None, :]) - _f(m_rows)).sum(axis=1)
        f_kr = _f(np.array([kappa[r], kappa[r] - d]))
        dk = -(f_kr[1] - f_kr[0]) - (_f(kappa + d) - _f(kappa))
        out = base_r + gain + dk
        out[r] = 0.0
        return out

    def delta_u(self, i: int) -> np.ndarray:
        """ΔL of moving u_i to each candidate U-block (0 at its block)."""
        return self._delta_generic(self.m, self.ku, int(self.gu[i]),
                                   float(self.deg_u[i]),
                                   self._edge_profile_u(i), self.k)

    def delta_v(self, j: int) -> np.ndarray:
        """ΔL of moving v_j to each candidate V-block (0 at its block)."""
        return self._delta_generic(self.m.T.copy(), self.kv, int(self.gv[j]),
                                   float(self.deg_v[j]),
                                   self._edge_profile_v(j), self.k)

    def move_u(self, i: int, r_new: int):
        r = self.gu[i]
        if r == r_new:
            return
        e = self._edge_profile_u(i)
        d = self.deg_u[i]
        self.m[r] -= e
        self.m[r_new] += e
        self.ku[r] -= d
        self.ku[r_new] += d
        self.gu[i] = r_new

    def move_v(self, j: int, r_new: int):
        r = self.gv[j]
        if r == r_new:
            return
        e = self._edge_profile_v(j)
        d = self.deg_v[j]
        self.m[:, r] -= e
        self.m[:, r_new] += e
        self.kv[r] -= d
        self.kv[r_new] += d
        self.gv[j] = r_new


def _greedy_sweeps(st: _State, rng: np.random.Generator, max_sweeps: int) -> None:
    for _ in range(max_sweeps):
        moved = 0
        for i in rng.permutation(st.n_u):
            delta = st.delta_u(i)
            b = int(delta.argmax())
            if delta[b] > 1e-9:
                st.move_u(i, b)
                moved += 1
        for j in rng.permutation(st.n_v):
            delta = st.delta_v(j)
            b = int(delta.argmax())
            if delta[b] > 1e-9:
                st.move_v(j, b)
                moved += 1
        if moved == 0:
            break


def bisbm_kl_baseline(ds: BipartiteDataset, k: int, *, seed: int = 0,
                      max_sweeps: int = 20) -> np.ndarray:
    rng = np.random.default_rng(seed)
    st = _State(ds, k, rng)
    _greedy_sweeps(st, rng, max_sweeps)
    return st.gu.copy()


def bisbm_mcmc_baseline(ds: BipartiteDataset, k: int, *, seed: int = 0,
                        n_sweeps: int = 30, t_start: float = 2.0,
                        t_end: float = 0.05) -> np.ndarray:
    rng = np.random.default_rng(seed)
    st = _State(ds, k, rng)
    temps = np.geomspace(t_start, t_end, n_sweeps)
    for temp in temps:
        for i in rng.permutation(st.n_u):
            cand = int(rng.integers(k))
            delta = st.delta_u(i)[cand]
            if delta > 0 or rng.random() < np.exp(delta / temp):
                st.move_u(i, cand)
        for j in rng.permutation(st.n_v):
            cand = int(rng.integers(k))
            delta = st.delta_v(j)[cand]
            if delta > 0 or rng.random() < np.exp(delta / temp):
                st.move_v(j, cand)
    _greedy_sweeps(st, rng, 5)  # zero-temperature polish (MAP estimate)
    return st.gu.copy()
