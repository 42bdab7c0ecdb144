"""Dense Laplacian toolkit vs closed-form graph theory."""
import numpy as np
import pytest

from repro.graph.csr import CSRGraph
from repro.linalg.laplacian import (
    absorption_probabilities,
    cfcc_group,
    cfcc_single_all,
    keep_indices,
    laplacian_dense,
    laplacian_pinv,
    marginal_gain_all_exact,
    marginal_gain_exact,
    remove_node_inverse_downdate,
    schur_complement,
    submatrix_inverse,
    trace_l_sub_inv,
)


def path_graph(n: int) -> CSRGraph:
    return CSRGraph.from_edges(np.stack([np.arange(n - 1), np.arange(1, n)], 1), n)


def cycle_graph(n: int) -> CSRGraph:
    e = np.stack([np.arange(n), (np.arange(n) + 1) % n], 1)
    return CSRGraph.from_edges(e, n)


def complete_graph(n: int) -> CSRGraph:
    iu = np.triu_indices(n, 1)
    return CSRGraph.from_edges(np.stack(iu, 1), n)


def resistance(L: np.ndarray, i: int, j: int) -> float:
    Ld = laplacian_pinv(L)
    return Ld[i, i] + Ld[j, j] - 2 * Ld[i, j]


class TestLaplacianBasics:
    def test_row_sums_zero(self, karate):
        L = laplacian_dense(karate)
        np.testing.assert_allclose(L.sum(axis=1), 0, atol=1e-12)

    def test_symmetric(self, ba200):
        L = laplacian_dense(ba200)
        np.testing.assert_allclose(L, L.T)

    def test_diagonal_is_degree(self, karate):
        L = laplacian_dense(karate)
        np.testing.assert_array_equal(np.diag(L), karate.degrees)

    def test_psd(self, karate):
        w = np.linalg.eigvalsh(laplacian_dense(karate))
        assert w.min() > -1e-9
        assert abs(w[0]) < 1e-9  # one zero eigenvalue (connected)
        assert w[1] > 1e-9


class TestPinv:
    def test_pinv_identity(self, karate):
        L = laplacian_dense(karate)
        Ld = laplacian_pinv(L)
        n = L.shape[0]
        P = np.eye(n) - np.full((n, n), 1.0 / n)
        np.testing.assert_allclose(L @ Ld, P, atol=1e-8)

    def test_pinv_rowsums_zero(self, karate):
        Ld = laplacian_pinv(laplacian_dense(karate))
        np.testing.assert_allclose(Ld.sum(axis=1), 0, atol=1e-8)

    @pytest.mark.parametrize("n", [4, 7, 10])
    def test_path_resistance(self, n):
        # On a path of unit resistors, R(i, j) = |i - j|.
        L = laplacian_dense(path_graph(n))
        assert resistance(L, 0, n - 1) == pytest.approx(n - 1, rel=1e-9)
        assert resistance(L, 1, 3) == pytest.approx(2, rel=1e-9)

    @pytest.mark.parametrize("n", [5, 8, 12])
    def test_cycle_resistance(self, n):
        # Cycle: R(i, j) = d(n-d)/n with d the hop distance.
        L = laplacian_dense(cycle_graph(n))
        d = 2
        assert resistance(L, 0, d) == pytest.approx(d * (n - d) / n, rel=1e-9)

    @pytest.mark.parametrize("n", [4, 6, 9])
    def test_complete_resistance(self, n):
        # K_n: R(i, j) = 2/n for all pairs.
        L = laplacian_dense(complete_graph(n))
        assert resistance(L, 0, 1) == pytest.approx(2 / n, rel=1e-9)


class TestSubmatrixInverse:
    def test_resistance_via_submatrix(self, karate):
        # Eq. (2): R(i, j) = (L_{-j}^{-1})_{ii}.
        L = laplacian_dense(karate)
        M, keep = submatrix_inverse(L, [7])
        i_local = int(np.where(keep == 3)[0][0])
        assert M[i_local, i_local] == pytest.approx(resistance(L, 3, 7), rel=1e-9)

    def test_grounded_voltage_interpretation(self):
        # Path 0-1-2 grounded at 0: (L_{-0}^{-1})_{22} = 2 (series resistors).
        L = laplacian_dense(path_graph(3))
        M, keep = submatrix_inverse(L, [0])
        assert M[1, 1] == pytest.approx(2.0)
        assert M[0, 0] == pytest.approx(1.0)
        assert M[0, 1] == pytest.approx(1.0)

    def test_trace(self, karate):
        L = laplacian_dense(karate)
        M, _ = submatrix_inverse(L, [0, 33])
        assert trace_l_sub_inv(L, [0, 33]) == pytest.approx(np.trace(M), rel=1e-10)

    def test_keep_indices(self):
        np.testing.assert_array_equal(keep_indices(5, [1, 3]), [0, 2, 4])


class TestCFCC:
    def test_group_vs_single(self, karate):
        # For |S| = 1 the group CFCC must equal the single-node CFCC.
        L = laplacian_dense(karate)
        singles = cfcc_single_all(L)
        for u in [0, 5, 33]:
            assert cfcc_group(L, [u]) == pytest.approx(singles[u], rel=1e-9)

    def test_monotone_in_s(self, karate):
        # Supermodularity implies C(S) grows as S grows.
        L = laplacian_dense(karate)
        assert cfcc_group(L, [33, 0]) > cfcc_group(L, [33])
        assert cfcc_group(L, [33, 0, 2]) > cfcc_group(L, [33, 0])

    def test_best_single_node_karate(self, karate):
        # Node 33 (the instructor, max degree) has the max single CFCC.
        L = laplacian_dense(karate)
        assert int(np.argmax(cfcc_single_all(L))) == 33


class TestMarginalGain:
    @pytest.mark.parametrize("S", [[33], [33, 0], [5, 10]])
    def test_formula_matches_trace_difference(self, karate, S):
        # Eq. (5): Δ(u,S) = (L_{-S}^{-2})_uu / (L_{-S}^{-1})_uu.
        L = laplacian_dense(karate)
        gains = marginal_gain_all_exact(L, S)
        for u in [1, 8, 20]:
            if u in S:
                continue
            assert gains[u] == pytest.approx(marginal_gain_exact(L, S, u), rel=1e-8)

    def test_gain_positive(self, karate):
        L = laplacian_dense(karate)
        gains = marginal_gain_all_exact(L, [33])
        assert all(v > 0 for v in gains.values())


class TestDowndate:
    @pytest.mark.parametrize("u_local", [0, 3, 17])
    def test_matches_recompute(self, karate, u_local):
        L = laplacian_dense(karate)
        M, keep = submatrix_inverse(L, [33])
        down = remove_node_inverse_downdate(M, u_local)
        expect, _ = submatrix_inverse(L, [33, int(keep[u_local])])
        np.testing.assert_allclose(down, expect, atol=1e-8)


class TestSchurAndAbsorption:
    def test_absorption_rows_sum_to_one(self, karate):
        # With S = ∅-like single root plus T, every U node is absorbed in S∪T;
        # row sums of [F | absorption into S] = 1. Here: check F row sums <= 1.
        L = laplacian_dense(karate)
        F, U_ids, T_ids = absorption_probabilities(L, [26], [33, 0])
        assert ((F >= -1e-12) & (F <= 1 + 1e-12)).all()
        assert (F.sum(axis=1) <= 1 + 1e-9).all()

    def test_absorption_on_path(self):
        # Path 0-1-2-3, S={0}, T={3}: gambler's ruin, Pr(ρ_u=3) = u/3.
        L = laplacian_dense(path_graph(4))
        F, U_ids, T_ids = absorption_probabilities(L, [0], [3])
        for i, u in enumerate(U_ids):
            assert F[i, 0] == pytest.approx(u / 3, rel=1e-9)

    def test_schur_is_laplacian_submatrix_identity(self, karate):
        # Lemma 4.3: S_T(L_{-S}) = (S_{S∪T}(L))_{-S}.
        L = laplacian_dense(karate)
        S, T = [4], [33, 0, 2]
        lhs = schur_complement(L, S, T)
        # Right side: Schur of L onto S∪T, then drop S rows/cols.
        both = sorted(S) + sorted(T)
        keep = keep_indices(L.shape[0], both)
        LB = L[np.ix_(both, both)] - L[np.ix_(both, keep)] @ np.linalg.solve(
            L[np.ix_(keep, keep)], L[np.ix_(keep, both)]
        )
        # Order of `both` is [S..., T...]; drop the S block.
        rhs = LB[len(S):, len(S):]
        np.testing.assert_allclose(lhs, rhs, atol=1e-8)

    def test_block_inverse_identity(self, karate):
        # Eq. (11): bottom-right block of L_{-S}^{-1} equals S_T(L_{-S})^{-1}.
        L = laplacian_dense(karate)
        S, T = [4], [33, 0]
        M, keep = submatrix_inverse(L, S)
        T_ids = np.asarray(sorted(T))
        t_local = np.searchsorted(keep, T_ids)
        block = M[np.ix_(t_local, t_local)]
        np.testing.assert_allclose(
            block, np.linalg.inv(schur_complement(L, S, T)), atol=1e-8
        )
