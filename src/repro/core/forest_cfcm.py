"""FORESTCFCM — greedy CFCM via spanning-forest sampling (Algorithm 3).

First iteration: root the forests at the maximum-degree node ``s`` and
estimate ``L†_uu`` up to the constant ``(1/n²)1ᵀL_{-s}^{-1}1`` via
Lemma 3.5 (the constant is identical for all ``u`` and is omitted, as the
paper notes). Subsequent iterations: FORESTDELTA (Algorithm 2) estimates
``Δ(u, S) = (L_{-S}^{-2})_{uu} / (L_{-S}^{-1})_{uu}`` with JL-projected
numerators and forest-sampled entries; the node of maximum estimated
gain is added.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession

from repro.core.params import Params
from repro.forest.distributed import ForestStats, adaptive_forest_stats
from repro.graph.csr import CSRGraph
from repro.linalg.jl import rademacher_matrix

__all__ = ["first_node_scores", "forest_delta", "forest_cfcm", "GreedyResult"]


@dataclass
class GreedyResult:
    """Output of a greedy CFCM run."""

    S: list[int]
    seconds: float
    forests_per_iter: list[int] = field(default_factory=list)


def first_node_scores(
    spark: SparkSession | None, g: CSRGraph, params: Params
) -> tuple[np.ndarray, ForestStats]:
    """Estimated ``x_u = L†_uu − (1/n²)1ᵀL_{-s}^{-1}1`` for all ``u`` (lines 1–13).

    ``x_s = 0`` by Lemma 3.5; smaller ``x`` means larger single-node CFCC.
    """
    s = int(np.argmax(g.degrees))
    ones = np.ones((1, g.n))
    ones[0, s] = 0.0
    stats, _ = adaptive_forest_stats(
        spark, g, [s], ones, params.eps, seed=params.seed, config=params.sample
    )
    x = stats.z - (2.0 / g.n) * stats.y[0]
    x[s] = 0.0
    return x, stats


def forest_delta(
    spark: SparkSession | None,
    g: CSRGraph,
    S: list[int],
    params: Params,
    *,
    seed: int,
) -> tuple[np.ndarray, int]:
    """FORESTDELTA (Algorithm 2): ``(Δ'(u, S) array, forests sampled)``.

    ``Δ'`` is −inf at nodes of ``S`` so callers can argmax directly.
    """
    n = g.n
    rng = np.random.default_rng(seed)
    W = rademacher_matrix(params.jl_width(n), n, rng=rng)
    W[:, np.asarray(S, dtype=np.int64)] = 0.0
    stats, _ = adaptive_forest_stats(
        spark, g, S, W, params.eps, seed=seed, config=params.sample
    )
    num = np.einsum("ij,ij->j", stats.y, stats.y)
    # (L_{-S}^{-1})_{uu} >= 1/d_u (Neumann bound used in Lemma 3.9's proof):
    # floor the noisy denominator to keep the ratio stable.
    den = np.maximum(stats.z, 1.0 / np.maximum(g.degrees, 1))
    delta = num / den
    delta[np.asarray(S, dtype=np.int64)] = -np.inf
    return delta, stats.n_forests


def forest_cfcm(
    spark: SparkSession | None, g: CSRGraph, k: int, params: Params | None = None
) -> GreedyResult:
    """FORESTCFCM (Algorithm 3): greedy size-``k`` CFCM solution."""
    params = params or Params()
    if not 1 <= k < g.n:
        raise ValueError("need 1 <= k < n")
    t0 = time.perf_counter()
    x, stats0 = first_node_scores(spark, g, params)
    S = [int(np.argmin(x))]
    forests = [stats0.n_forests]
    for i in range(1, k):
        delta, n_f = forest_delta(spark, g, S, params, seed=params.seed + 1000 * i)
        S.append(int(np.argmax(delta)))
        forests.append(n_f)
    return GreedyResult(S=S, seconds=time.perf_counter() - t0, forests_per_iter=forests)
