"""Unbiasedness of forest-sampling estimators vs dense ground truth.

These are the load-bearing correctness tests for the paper's Lemmas 3.3,
3.5 and 4.2: empirical means over many sampled forests must converge to
entries of ``L_{-S}^{-1}``, ``L†`` combinations and absorption
probabilities. Seeds are fixed; tolerances are ~4σ of the Monte-Carlo
error at the chosen sample sizes.
"""
import numpy as np
import pytest

from repro.forest.distributed import SampleConfig, adaptive_forest_stats, bernstein_bound
from repro.forest.estimators import bfs_tree_for_roots, forest_contrib, forest_masks, telescope
from repro.forest.wilson import sample_forest
from repro.graph.csr import CSRGraph
from repro.linalg.laplacian import (
    absorption_probabilities,
    laplacian_dense,
    laplacian_pinv,
    submatrix_inverse,
)

BIG = SampleConfig(batch0=4096, r_coeff=1e9, max_rounds=1, use_spark=False)


def _dense_diag(L, S, n):
    M, keep = submatrix_inverse(L, S)
    out = np.zeros(n)
    out[keep] = np.diag(M)
    return out


class TestTelescope:
    def test_prefix_sum_on_path(self):
        g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [2, 3]]), 4)
        bfs = bfs_tree_for_roots(g, [0])
        delta = np.array([0.0, 1.0, 2.0, 3.0])
        np.testing.assert_allclose(telescope(bfs, delta), [0, 1, 3, 6])

    def test_2d_delta(self, karate):
        bfs = bfs_tree_for_roots(karate, [33])
        rng = np.random.default_rng(0)
        delta = rng.standard_normal((2, karate.n))
        phi = telescope(bfs, delta)
        # Row-wise equals 1-D telescoping.
        np.testing.assert_allclose(phi[0], telescope(bfs, delta[0]))
        np.testing.assert_allclose(phi[1], telescope(bfs, delta[1]))

    def test_root_is_zero(self, karate):
        bfs = bfs_tree_for_roots(karate, [5, 7])
        phi = telescope(bfs, np.ones(karate.n))
        assert phi[5] == 0.0 and phi[7] == 0.0


class TestForestMasks:
    def test_masks_disjoint_and_valid(self, karate):
        bfs = bfs_tree_for_roots(karate, [33])
        parent, _ = sample_forest(karate, np.array([33]), np.random.default_rng(3))
        fwd, rev = forest_masks(parent, bfs)
        assert not (fwd & rev).any()  # a BFS edge can't be traversed both ways
        assert not fwd[33] and not rev[33]
        # fwd[u] means the forest edge equals the BFS edge.
        for u in np.nonzero(fwd)[0]:
            assert parent[u] == bfs.parent[u]
        for u in np.nonzero(rev)[0]:
            assert parent[bfs.parent[u]] == u


class TestDiagonalEstimator:
    @pytest.mark.parametrize("S", [[33], [33, 0], [5, 20, 31]])
    def test_z_unbiased_karate(self, karate, S):
        L = laplacian_dense(karate)
        stats, _ = adaptive_forest_stats(None, karate, S, None, 0.2, seed=0, config=BIG)
        true = _dense_diag(L, S, karate.n)
        keep = true > 0
        rel = np.abs(stats.z[keep] - true[keep]) / true[keep]
        assert rel.max() < 0.12

    def test_z_zero_at_roots(self, karate):
        stats, _ = adaptive_forest_stats(None, karate, [33, 0], None, 0.2, seed=0, config=BIG)
        assert stats.z[33] == 0.0 and stats.z[0] == 0.0

    def test_z_on_grid(self, grid5):
        L = laplacian_dense(grid5)
        S = [0, 24]
        stats, _ = adaptive_forest_stats(None, grid5, S, None, 0.2, seed=1, config=BIG)
        true = _dense_diag(L, S, grid5.n)
        keep = true > 0
        assert (np.abs(stats.z[keep] - true[keep]) / true[keep]).max() < 0.12


class TestWeightedEstimator:
    def test_y_unbiased(self, karate):
        L = laplacian_dense(karate)
        S = [33, 2]
        rng = np.random.default_rng(4)
        W = rng.choice([-1.0, 1.0], size=(4, karate.n))
        W[:, S] = 0.0
        stats, _ = adaptive_forest_stats(None, karate, S, W, 0.2, seed=2, config=BIG)
        M, keep = submatrix_inverse(L, S)
        true = np.zeros((4, karate.n))
        true[:, keep] = W[:, keep] @ M
        assert np.abs(stats.y - true).max() < 0.35  # abs err; entries are O(1..5)

    def test_ones_row_estimates_column_sums(self, karate):
        # Eq. (7): Φ̄_{1,S}(u) estimates 1ᵀ L_{-S}^{-1} e_u.
        L = laplacian_dense(karate)
        s = int(np.argmax(karate.degrees))
        ones = np.ones((1, karate.n))
        ones[0, s] = 0.0
        stats, _ = adaptive_forest_stats(None, karate, [s], ones, 0.2, seed=3, config=BIG)
        M, keep = submatrix_inverse(L, [s])
        true = np.zeros(karate.n)
        true[keep] = M.sum(axis=0)
        rel = np.abs(stats.y[0][keep] - true[keep]) / np.abs(true[keep])
        assert rel.max() < 0.15


class TestPinvDiagEstimator:
    def test_first_iteration_scores(self, karate):
        # Lemma 3.5: x_u = L†_uu − (1/n²)1ᵀL_{-s}^{-1}1, estimated by sampling.
        from repro.core.forest_cfcm import first_node_scores
        from repro.core.params import Params

        L = laplacian_dense(karate)
        n = karate.n
        s = int(np.argmax(karate.degrees))
        M, _ = submatrix_inverse(L, [s])
        const = M.sum() / n**2
        true = np.diag(laplacian_pinv(L)) - const
        params = Params(eps=0.2, sample=BIG)
        x, _ = first_node_scores(None, karate, params)
        assert np.abs(x - true).max() < 0.05
        # Ranking agreement on the winner.
        assert int(np.argmin(x)) == int(np.argmin(true))


class TestAbsorptionEstimator:
    def test_f_hat_unbiased(self, karate):
        L = laplacian_dense(karate)
        S, T = [26], [33, 0]
        F_ex, U_ids, T_ids = absorption_probabilities(L, S, T)
        roots = sorted(S) + sorted(T)
        stats, _ = adaptive_forest_stats(
            None, karate, roots, None, 0.2, t_nodes=sorted(T), seed=5, config=BIG
        )
        assert np.abs(stats.f_hat[U_ids] - F_ex).max() < 0.05

    def test_f_hat_rows_sum_to_one_without_s(self, karate):
        # With S empty-equivalent (all roots in T), absorption rows sum to 1.
        T = [33, 0, 32]
        stats, _ = adaptive_forest_stats(
            None, karate, T, None, 0.2, t_nodes=sorted(T), seed=6, config=BIG
        )
        U = [u for u in range(karate.n) if u not in T]
        np.testing.assert_allclose(stats.f_hat[U].sum(axis=1), 1.0, atol=1e-12)


class TestBernstein:
    def test_bound_shrinks_with_n(self):
        var = np.array([1.0])
        sup = np.array([3.0])
        b1 = bernstein_bound(var, sup, 100, 0.01)
        b2 = bernstein_bound(var, sup, 10000, 0.01)
        assert b2 < b1

    def test_zero_variance_linear_term(self):
        b = bernstein_bound(np.array([0.0]), np.array([2.0]), 1000, 0.01)
        assert b[0] == pytest.approx(3 * 2.0 * np.log(300) / 1000)

    def test_adaptive_early_stop(self, karate):
        # Generous cap, loose eps: the Bernstein stop must fire well below cap.
        cfg = SampleConfig(batch0=256, r_coeff=1e9, max_rounds=10, min_forests=64, use_spark=False)
        stats, _ = adaptive_forest_stats(None, karate, [33], None, 0.9, seed=7, config=cfg)
        assert stats.n_forests < 10000

    def test_variance_accumulator(self, karate):
        stats, _ = adaptive_forest_stats(None, karate, [33], None, 0.2, seed=8, config=BIG)
        assert (stats.z_var() >= 0).all()
        # Nodes nearer the root have smaller path variance on average.
        bfs = bfs_tree_for_roots(karate, [33])
        near = stats.z_var()[bfs.depth == 1].mean()
        far = stats.z_var()[bfs.depth == bfs.depth.max()].mean()
        assert near < far


class TestStatsAccumulator:
    def test_add_merges_counts(self, karate):
        cfg1 = SampleConfig(batch0=128, r_coeff=1e9, max_rounds=1, use_spark=False)
        a, _ = adaptive_forest_stats(None, karate, [33], None, 0.2, seed=1, config=cfg1)
        b, _ = adaptive_forest_stats(None, karate, [33], None, 0.2, seed=2, config=cfg1)
        za, zb = a.z.copy(), b.z.copy()
        na, nb = a.n_forests, b.n_forests
        merged = a.add(b)
        assert merged.n_forests == na + nb
        np.testing.assert_allclose(merged.z, (za * na + zb * nb) / (na + nb))
