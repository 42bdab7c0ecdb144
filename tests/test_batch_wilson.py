"""Vectorized batch Wilson sampler: validity, distribution, estimator parity."""
from collections import Counter

import numpy as np
import pytest

from repro.forest.distributed import SampleConfig, adaptive_forest_stats
from repro.forest.estimators import bfs_tree_for_roots, chunk_stats
from repro.forest.wilson import forest_depths, sample_forests_batch
from repro.graph.csr import CSRGraph

BIG = SampleConfig(batch0=4096, r_coeff=1e9, max_rounds=1, use_spark=False)


class TestBatchValidity:
    @pytest.mark.parametrize("seed", range(3))
    def test_each_forest_valid(self, karate, seed):
        roots = np.array([0, 33])
        parents, roots_of = sample_forests_batch(karate, roots, 16, np.random.default_rng(seed))
        assert parents.shape == (16, karate.n)
        for b in range(16):
            depth = forest_depths(parents[b])
            for u in range(karate.n):
                if u in (0, 33):
                    assert parents[b, u] == -1 and roots_of[b, u] == u
                else:
                    assert parents[b, u] in karate.neighbors(u)
                    assert depth[u] == depth[parents[b, u]] + 1
                    assert roots_of[b, u] in (0, 33)

    def test_forests_differ_within_batch(self, karate):
        parents, _ = sample_forests_batch(karate, np.array([33]), 8, np.random.default_rng(0))
        assert len({tuple(p) for p in parents}) > 1

    def test_deterministic(self, karate):
        a, _ = sample_forests_batch(karate, np.array([33]), 8, np.random.default_rng(4))
        b, _ = sample_forests_batch(karate, np.array([33]), 8, np.random.default_rng(4))
        np.testing.assert_array_equal(a, b)


class TestBatchDistribution:
    def test_uniform_on_triangle(self):
        # Same check as the sequential sampler: 3 spanning trees, 1/3 each.
        g = CSRGraph.from_edges(np.array([[0, 1], [1, 2], [0, 2]]), 3)
        counts = Counter()
        parents, _ = sample_forests_batch(g, np.array([0]), 6000, np.random.default_rng(1))
        for b in range(parents.shape[0]):
            counts[(int(parents[b, 1]), int(parents[b, 2]))] += 1
        assert set(counts) == {(0, 0), (0, 1), (2, 0)}
        for v in counts.values():
            assert abs(v / 6000 - 1 / 3) < 0.03

    def test_two_root_split(self):
        g = CSRGraph.from_edges(np.array([[0, 1], [1, 2]]), 3)
        _, roots_of = sample_forests_batch(g, np.array([0, 2]), 4000, np.random.default_rng(2))
        frac = (roots_of[:, 1] == 0).mean()
        assert abs(frac - 0.5) < 0.04


class TestChunkStats:
    def test_matches_sequential_estimator_statistically(self, karate):
        # The batched pipeline must estimate the same quantities as the
        # dense ground truth (transitively: as the sequential pipeline).
        from repro.linalg.laplacian import laplacian_dense, submatrix_inverse

        S = [33, 0]
        bfs = bfs_tree_for_roots(karate, S)
        rng = np.random.default_rng(0)
        W = rng.choice([-1.0, 1.0], size=(3, karate.n))
        W[:, S] = 0.0
        W_T = np.ascontiguousarray(W.T)
        n_tot, z_sum, z_sq, y_sum_T, _ = chunk_stats(karate, bfs, W_T, None, 0, 7, 4000)
        M, keep = submatrix_inverse(laplacian_dense(karate), S)
        diag_true = np.zeros(karate.n)
        diag_true[keep] = np.diag(M)
        z = z_sum / n_tot
        nz = diag_true > 0
        assert (np.abs(z[nz] - diag_true[nz]) / diag_true[nz]).max() < 0.12
        WM_true = np.zeros((karate.n, 3))
        WM_true[keep] = M @ W[:, keep].T
        assert np.abs(y_sum_T / n_tot - WM_true).max() < 0.4

    def test_root_counts(self, karate):
        bfs = bfs_tree_for_roots(karate, [5, 33, 0])
        t_col = np.full(karate.n, -1, dtype=np.int64)
        t_col[33], t_col[0] = 0, 1
        n_tot, _, _, _, rc = chunk_stats(karate, bfs, None, t_col, 2, 3, 500)
        # Counts bounded by the forest count; roots of S never counted.
        assert rc.max() <= n_tot
        assert rc[5].sum() == 0  # node 5 is a root itself
        U = [u for u in range(karate.n) if u not in (5, 33, 0)]
        assert rc[U].sum() > 0

    def test_adaptive_uses_chunks(self, karate):
        stats, _ = adaptive_forest_stats(None, karate, [33], None, 0.2, seed=1, config=BIG)
        assert stats.n_forests == 4096
        assert stats.y_sum is None
