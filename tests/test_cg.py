"""CG solver vs dense ground truth."""
import numpy as np
import pytest

from repro.linalg.cg import laplacian_matvec, solve_pinv, solve_submatrix
from repro.linalg.laplacian import laplacian_dense, laplacian_pinv, submatrix_inverse


class TestMatvec:
    def test_full_laplacian(self, karate):
        L = laplacian_dense(karate)
        x = np.random.default_rng(1).random(karate.n)
        np.testing.assert_allclose(laplacian_matvec(karate, x), L @ x, atol=1e-10)

    def test_submatrix(self, karate):
        L = laplacian_dense(karate)
        S = [0, 33]
        mask = np.zeros(karate.n, dtype=bool)
        mask[S] = True
        x = np.random.default_rng(2).random(karate.n)
        got = laplacian_matvec(karate, x, mask)
        x2 = np.where(mask, 0.0, x)
        expect = np.where(mask, 0.0, L @ x2)
        np.testing.assert_allclose(got, expect, atol=1e-10)


class TestSolveSubmatrix:
    @pytest.mark.parametrize("S", [[0], [33, 0], [5, 10, 20]])
    def test_matches_dense(self, karate, S):
        L = laplacian_dense(karate)
        M, keep = submatrix_inverse(L, S)
        rng = np.random.default_rng(3)
        b = rng.standard_normal(karate.n)
        x = solve_submatrix(karate, b, S, tol=1e-10)
        expect = np.zeros(karate.n)
        expect[keep] = M @ b[keep]
        np.testing.assert_allclose(x, expect, atol=1e-6)

    def test_zero_at_removed_nodes(self, ba200):
        b = np.ones(ba200.n)
        x = solve_submatrix(ba200, b, [0, 7], tol=1e-8)
        assert x[0] == 0.0 and x[7] == 0.0

    def test_larger_graph(self, ba200):
        L = laplacian_dense(ba200)
        S = [int(np.argmax(ba200.degrees))]
        M, keep = submatrix_inverse(L, S)
        b = np.random.default_rng(4).standard_normal(ba200.n)
        x = solve_submatrix(ba200, b, S, tol=1e-10)
        expect = np.zeros(ba200.n)
        expect[keep] = M @ b[keep]
        np.testing.assert_allclose(x, expect, atol=1e-5)


class TestSolvePinv:
    def test_matches_dense_pinv(self, karate):
        L = laplacian_dense(karate)
        Ld = laplacian_pinv(L)
        b = np.random.default_rng(5).standard_normal(karate.n)
        x = solve_pinv(karate, b, tol=1e-10)
        np.testing.assert_allclose(x, Ld @ (b - b.mean()), atol=1e-6)

    def test_orthogonal_to_ones(self, ba200):
        b = np.random.default_rng(6).standard_normal(ba200.n)
        x = solve_pinv(ba200, b)
        assert abs(x.sum()) < 1e-6

    def test_residual(self, ba200):
        b = np.random.default_rng(7).standard_normal(ba200.n)
        b -= b.mean()
        x = solve_pinv(ba200, b, tol=1e-9)
        r = laplacian_matvec(ba200, x) - b
        assert np.linalg.norm(r) < 1e-6 * np.linalg.norm(b)
