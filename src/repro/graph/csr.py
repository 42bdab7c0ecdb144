"""Compact CSR adjacency used inside Spark tasks.

A :class:`CSRGraph` is a frozen numpy CSR of an undirected simple graph.
It is small (two int arrays), picklable, and broadcast once per graph to
all executors; every random-walk / BFS / matvec kernel in this repo runs
against it. Construction accepts either a canonical numpy edge array or a
Spark edge DataFrame (``src``/``dst`` columns).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

__all__ = ["CSRGraph", "local_bfs_tree", "local_connected_components", "estimate_diameter"]


@dataclass(frozen=True)
class CSRGraph:
    """Undirected graph in CSR form (both directions stored).

    Attributes
    ----------
    n : number of nodes (ids are ``0..n-1``)
    indptr : int64 array of length ``n + 1``
    indices : int64 array of length ``2m`` — neighbours of node ``u`` are
        ``indices[indptr[u]:indptr[u+1]]``, sorted ascending
    """

    n: int
    indptr: np.ndarray
    indices: np.ndarray
    degrees: np.ndarray = field(init=False)

    def __post_init__(self) -> None:
        object.__setattr__(self, "degrees", np.diff(self.indptr).astype(np.int64))

    @property
    def m(self) -> int:
        """Number of undirected edges."""
        return int(len(self.indices) // 2)

    def neighbors(self, u: int) -> np.ndarray:
        return self.indices[self.indptr[u] : self.indptr[u + 1]]

    def edge_array(self) -> np.ndarray:
        """Canonical ``(m, 2)`` edge array (src < dst)."""
        src = np.repeat(np.arange(self.n, dtype=np.int64), self.degrees)
        keep = src < self.indices
        return np.stack([src[keep], self.indices[keep]], axis=1)

    def adj_matvec(self, x: np.ndarray) -> np.ndarray:
        """``A @ x`` for the adjacency matrix, via segment sums."""
        gathered = x[self.indices]
        out = np.add.reduceat(gathered, self.indptr[:-1])
        out[self.degrees == 0] = 0.0
        return out

    @classmethod
    def from_edges(cls, edges: np.ndarray, n: int | None = None) -> "CSRGraph":
        """Build from a canonical ``(m, 2)`` edge array."""
        edges = np.asarray(edges, dtype=np.int64).reshape(-1, 2)
        if n is None:
            n = int(edges.max()) + 1 if len(edges) else 0
        both = np.concatenate([edges, edges[:, ::-1]])
        order = np.lexsort((both[:, 1], both[:, 0]))
        both = both[order]
        counts = np.bincount(both[:, 0], minlength=n)
        indptr = np.zeros(n + 1, dtype=np.int64)
        np.cumsum(counts, out=indptr[1:])
        return cls(n=n, indptr=indptr, indices=both[:, 1].copy())

    @classmethod
    def from_edge_df(cls, edge_df, n: int | None = None) -> "CSRGraph":
        """Build from a Spark DataFrame with ``src``/``dst`` columns."""
        pdf = edge_df.select("src", "dst").toPandas()
        edges = pdf[["src", "dst"]].to_numpy(dtype=np.int64)
        return cls.from_edges(edges, n=n)


def local_bfs_tree(
    g: CSRGraph, roots: np.ndarray | list[int]
) -> tuple[np.ndarray, np.ndarray, list[np.ndarray]]:
    """Multi-source BFS tree over the CSR graph.

    Returns ``(parent, depth, level_buckets)`` where ``parent[r] = -1`` for
    roots, ``depth[r] = 0``, and ``level_buckets[d]`` is the array of nodes
    at BFS depth ``d`` (``level_buckets[0]`` are the roots). Unreachable
    nodes keep ``parent = -1`` and ``depth = -1``; callers operating on a
    connected graph assert full coverage.
    """
    roots = np.asarray(roots, dtype=np.int64)
    parent = np.full(g.n, -1, dtype=np.int64)
    depth = np.full(g.n, -1, dtype=np.int64)
    depth[roots] = 0
    frontier = roots
    buckets = [roots.copy()]
    while len(frontier):
        # Vectorized frontier expansion: gather all neighbours, keep unseen.
        reps = g.degrees[frontier]
        total = int(reps.sum())
        if total == 0:
            break
        srcs = np.repeat(frontier, reps)
        starts = g.indptr[frontier]
        # Global offsets into `indices` for every (frontier node, slot) pair.
        cum = np.cumsum(reps) - reps
        offs = np.repeat(starts - cum, reps) + np.arange(total)
        nbrs = g.indices[offs]
        unseen = depth[nbrs] == -1
        nbrs, srcs = nbrs[unseen], srcs[unseen]
        if len(nbrs) == 0:
            break
        # First writer wins within a level.
        uniq, first = np.unique(nbrs, return_index=True)
        parent[uniq] = srcs[first]
        depth[uniq] = depth[srcs[first]] + 1
        frontier = uniq
        buckets.append(uniq)
    return parent, depth, buckets


def local_connected_components(g: CSRGraph) -> np.ndarray:
    """Component label per node (smallest node id in the component)."""
    label = np.full(g.n, -1, dtype=np.int64)
    for s in range(g.n):
        if label[s] != -1:
            continue
        label[s] = s
        stack = [s]
        while stack:
            u = stack.pop()
            for v in g.neighbors(u):
                if label[v] == -1:
                    label[v] = s
                    stack.append(int(v))
    return label


def estimate_diameter(g: CSRGraph, *, n_sweeps: int = 4, seed: int = 0) -> int:
    """Double-sweep lower-bound estimate of the diameter ``τ``.

    BFS from a start node, then BFS again from the farthest node found;
    repeated from a few random starts. Exact on trees; a tight lower bound
    in practice on real-world-like graphs — matches how ``τ`` is used in
    Table II (a descriptive graph statistic).
    """
    rng = np.random.default_rng(seed)
    best = 0
    starts = rng.integers(0, g.n, size=n_sweeps)
    for s in starts:
        _, d1, _ = local_bfs_tree(g, [int(s)])
        far = int(np.argmax(d1))
        _, d2, _ = local_bfs_tree(g, [far])
        best = max(best, int(d2.max()))
    return best
