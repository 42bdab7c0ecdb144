"""APPROXGREEDY — the state-of-the-art baseline of Li et al. [29].

Marginal gains are estimated with JL projections whose rows are obtained
by solving Laplacian systems (here: Jacobi-CG, see ``repro.linalg.cg``
for the substitution rationale):

* ``(L_{-S}^{-1})_uu  ≈ Σ_j (q_jᵀ B_{-S} L_{-S}^{-1} e_u)²`` using
  ``L_{-S} = B_{-S}ᵀ B_{-S}`` (B = edge-node incidence matrix);
* ``(L_{-S}^{-2})_uu  ≈ Σ_j (p_jᵀ L_{-S}^{-1} e_u)²``;

i.e. ``2w`` linear systems per greedy iteration — the ``Õ(k ε⁻³ m)``
regime whose ``m``-dominated cost Table II exhibits. The ``w`` solves are
fanned out over Spark tasks against the broadcast CSR graph.
"""
from __future__ import annotations

import time

import numpy as np
from pyspark.sql import SparkSession

from repro.core.forest_cfcm import GreedyResult
from repro.core.params import Params
from repro.graph.csr import CSRGraph
from repro.linalg.cg import solve_pinv, solve_submatrix

__all__ = ["approx_greedy", "jl_diag_estimates"]


def _incidence_transpose_apply(edges: np.ndarray, q: np.ndarray, n: int) -> np.ndarray:
    """``Bᵀ q`` for the canonical-orientation incidence matrix (m → n)."""
    out = np.zeros(n)
    np.add.at(out, edges[:, 0], q)
    np.subtract.at(out, edges[:, 1], q)
    return out


def _solve_rows(
    spark: SparkSession | None,
    g: CSRGraph,
    rhs_pairs: list[tuple[np.ndarray, np.ndarray | None]],
    S: list[int] | None,
    tol: float,
) -> list[tuple[np.ndarray, np.ndarray | None]]:
    """Solve one (or two) systems per JL row, distributed over Spark tasks.

    Each element of ``rhs_pairs`` is ``(b_num, b_den)``; ``b_den`` may be
    None (first iteration needs only the pseudoinverse solves).
    """

    if spark is None:
        return [_task_solve(g, p, S, tol) for p in rhs_pairs]
    sc = spark.sparkContext
    g_bc = sc.broadcast(g)
    try:
        out = (
            sc.parallelize(rhs_pairs, numSlices=min(len(rhs_pairs), sc.defaultParallelism))
            .map(lambda p: _task_solve(g_bc.value, p, S, tol))
            .collect()
        )
    finally:
        g_bc.destroy()
    return out


def _task_solve(g: CSRGraph, pair, S, tol):
    b_num, b_den = pair
    if S is None:
        y_num = solve_pinv(g, b_num, tol=tol)
        y_den = None if b_den is None else solve_pinv(g, b_den, tol=tol)
    else:
        y_num = solve_submatrix(g, b_num, S, tol=tol)
        y_den = None if b_den is None else solve_submatrix(g, b_den, S, tol=tol)
    return y_num, y_den


def jl_diag_estimates(
    spark: SparkSession | None,
    g: CSRGraph,
    S: list[int] | None,
    params: Params,
    *,
    seed: int,
) -> tuple[np.ndarray, np.ndarray | None]:
    """``(diag(L_{-S}^{-2}) est, diag(L_{-S}^{-1}) est)`` — or ``(diag L†, None)``.

    With ``S is None`` returns the first-iteration ``diag(L†)`` estimate
    (numerator-style projection through the incidence matrix only).
    """
    n = g.n
    edges = g.edge_array()
    m = len(edges)
    w = params.jl_width(n)
    rng = np.random.default_rng(seed)
    rhs_pairs = []
    for _ in range(w):
        q = rng.choice(np.array([-1.0, 1.0]), size=m) / np.sqrt(w)
        b_den = _incidence_transpose_apply(edges, q, n)  # (Bᵀq) — diag(L^{-1}) probe
        if S is None:
            rhs_pairs.append((b_den, None))
        else:
            p = rng.choice(np.array([-1.0, 1.0]), size=n) / np.sqrt(w)
            p[np.asarray(S, dtype=np.int64)] = 0.0
            rhs_pairs.append((p, b_den))
    sols = _solve_rows(spark, g, rhs_pairs, S, params.cg_tol)
    if S is None:
        Y = np.stack([y for y, _ in sols])  # rows q_jᵀ B L†
        return np.einsum("ij,ij->j", Y, Y), None
    Y_num = np.stack([y for y, _ in sols])  # rows p_jᵀ L_{-S}^{-1}
    Y_den = np.stack([y for _, y in sols])  # rows q_jᵀ B_{-S} L_{-S}^{-1}
    return (
        np.einsum("ij,ij->j", Y_num, Y_num),
        np.einsum("ij,ij->j", Y_den, Y_den),
    )


def approx_greedy(
    spark: SparkSession | None, g: CSRGraph, k: int, params: Params | None = None
) -> GreedyResult:
    """APPROXGREEDY: greedy CFCM with JL + Laplacian-solver gain estimates."""
    params = params or Params()
    if not 1 <= k < g.n:
        raise ValueError("need 1 <= k < n")
    t0 = time.perf_counter()
    diag_pinv, _ = jl_diag_estimates(spark, g, None, params, seed=params.seed)
    S = [int(np.argmin(diag_pinv))]
    for i in range(1, k):
        num, den = jl_diag_estimates(spark, g, S, params, seed=params.seed + 1000 * i)
        den = np.maximum(den, 1.0 / np.maximum(g.degrees, 1))
        delta = num / den
        delta[np.asarray(S, dtype=np.int64)] = -np.inf
        S.append(int(np.argmax(delta)))
    return GreedyResult(S=S, seconds=time.perf_counter() - t0)
