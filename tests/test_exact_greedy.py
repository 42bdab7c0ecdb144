"""EXACT greedy and brute-force optimum."""
import numpy as np
import pytest

from repro.core.exact import brute_force_optimum, exact_greedy
from repro.core.evaluate import cfcc_dense
from repro.graph.csr import CSRGraph
from repro.graph.generators import tiny_graph
from repro.linalg.laplacian import cfcc_group, laplacian_dense, trace_l_sub_inv


class TestExactGreedy:
    def test_k1_is_best_single(self, karate):
        L = laplacian_dense(karate)
        res = exact_greedy(karate, 1)
        best = min(range(karate.n), key=lambda u: trace_l_sub_inv(L, [u]))
        assert res.S == [best]

    def test_distinct_nodes(self, ba200):
        res = exact_greedy(ba200, 6)
        assert len(set(res.S)) == 6

    def test_monotone_improvement(self, karate):
        # Each greedy prefix strictly improves C(S).
        res = exact_greedy(karate, 5)
        L = laplacian_dense(karate)
        vals = [cfcc_group(L, res.S[: i + 1]) for i in range(5)]
        assert all(b > a for a, b in zip(vals, vals[1:]))

    def test_greedy_maximizes_each_step(self, karate):
        # Step i+1 must pick the argmax of the true marginal gain.
        from repro.linalg.laplacian import marginal_gain_all_exact

        L = laplacian_dense(karate)
        res = exact_greedy(karate, 4)
        for i in range(1, 4):
            gains = marginal_gain_all_exact(L, res.S[:i])
            best = max(gains.items(), key=lambda kv: kv[1])[0]
            assert res.S[i] == best

    def test_invalid_k(self, karate):
        with pytest.raises(ValueError):
            exact_greedy(karate, 0)
        with pytest.raises(ValueError):
            exact_greedy(karate, karate.n)


class TestBruteForce:
    @pytest.mark.parametrize("k", [1, 2])
    def test_opt_at_least_greedy(self, karate, k):
        S_opt, tr_opt = brute_force_optimum(karate, k)
        res = exact_greedy(karate, k)
        L = laplacian_dense(karate)
        assert tr_opt <= trace_l_sub_inv(L, res.S) + 1e-9

    def test_greedy_near_optimal_small(self):
        # Approximation-factor sanity on a tiny graph, k=3.
        edges, n = tiny_graph("zebra")
        g = CSRGraph.from_edges(edges, n)
        S_opt, _ = brute_force_optimum(g, 3)
        c_opt = cfcc_dense(g, S_opt)
        c_greedy = cfcc_dense(g, exact_greedy(g, 3).S)
        assert c_greedy >= 0.95 * c_opt  # far above the 1 - k/(k-1)/e bound

    def test_known_karate_optimum_matches_greedy_k2(self, karate):
        S_opt, _ = brute_force_optimum(karate, 2)
        assert sorted(S_opt) == sorted(exact_greedy(karate, 2).S)
