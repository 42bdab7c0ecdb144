"""Heuristic baselines DEGREE and TOP-CFCC (Section V-A).

DEGREE picks the ``k`` highest-degree nodes; TOP-CFCC ranks nodes by
their *individual* CFCC ``C(u) = n / (Tr(L†) + n·L†_uu)`` — i.e. by
ascending ``L†_uu`` — and picks the top ``k``. TOP-CFCC has an exact
dense form (small graphs) and a sampled form that reuses the
first-iteration forest estimator of FORESTCFCM (larger graphs).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from repro.core.forest_cfcm import first_node_scores
from repro.core.params import Params
from repro.graph.csr import CSRGraph
from repro.linalg.laplacian import laplacian_dense, laplacian_pinv

__all__ = ["degree_baseline", "top_cfcc_exact", "top_cfcc_sampled"]


def degree_baseline(g: CSRGraph, k: int) -> list[int]:
    """``k`` highest-degree nodes (ties broken by node id, ascending)."""
    order = np.lexsort((np.arange(g.n), -g.degrees))
    return [int(u) for u in order[:k]]


def top_cfcc_exact(g: CSRGraph, k: int) -> list[int]:
    """Top-``k`` nodes by exact single-node CFCC (ascending ``L†_uu``)."""
    diag = np.diag(laplacian_pinv(laplacian_dense(g)))
    order = np.lexsort((np.arange(g.n), diag))
    return [int(u) for u in order[:k]]


def top_cfcc_sampled(
    spark: SparkSession | None, g: CSRGraph, k: int, params: Params | None = None
) -> list[int]:
    """Top-``k`` by the forest-sampled ``L†_uu`` estimator (Lemma 3.5)."""
    params = params or Params()
    x, _ = first_node_scores(spark, g, params)
    order = np.lexsort((np.arange(g.n), x))
    return [int(u) for u in order[:k]]
