"""Graph generator properties: canonical form, connectivity, determinism."""
import numpy as np
import pytest

from repro.graph.generators import (
    barabasi_albert,
    canonical_edges,
    erdos_renyi,
    grid2d,
    is_connected_edges,
    karate_club,
    ring_with_shortcuts,
    tiny_graph,
    watts_strogatz,
)


def _check_canonical(edges: np.ndarray) -> None:
    assert edges.ndim == 2 and edges.shape[1] == 2
    assert (edges[:, 0] < edges[:, 1]).all(), "src < dst required"
    assert len(np.unique(edges, axis=0)) == len(edges), "duplicate edges"


class TestCanonicalEdges:
    def test_drops_self_loops(self):
        out = canonical_edges(np.array([[1, 1], [0, 2]]))
        assert out.tolist() == [[0, 2]]

    def test_undirects_and_dedupes(self):
        out = canonical_edges(np.array([[2, 0], [0, 2], [0, 2]]))
        assert out.tolist() == [[0, 2]]

    def test_sorted_output(self):
        out = canonical_edges(np.array([[5, 3], [1, 0], [2, 4]]))
        assert out.tolist() == sorted(out.tolist())


class TestConnectivityCheck:
    def test_connected_triangle(self):
        assert is_connected_edges(np.array([[0, 1], [1, 2], [0, 2]]), 3)

    def test_disconnected(self):
        assert not is_connected_edges(np.array([[0, 1], [2, 3]]), 4)

    def test_isolated_node(self):
        assert not is_connected_edges(np.array([[0, 1]]), 3)


@pytest.mark.parametrize("n,m_attach", [(50, 2), (120, 3), (300, 5), (200, 10)])
class TestBarabasiAlbert:
    def test_canonical_connected(self, n, m_attach):
        e = barabasi_albert(n, m_attach, seed=1)
        _check_canonical(e)
        assert is_connected_edges(e, n)

    def test_edge_count(self, n, m_attach):
        e = barabasi_albert(n, m_attach, seed=1)
        n0 = m_attach + 1
        expected = n0 * (n0 - 1) // 2 + (n - n0) * m_attach
        assert len(e) == expected

    def test_deterministic(self, n, m_attach):
        a = barabasi_albert(n, m_attach, seed=9)
        b = barabasi_albert(n, m_attach, seed=9)
        assert np.array_equal(a, b)

    def test_seed_changes_graph(self, n, m_attach):
        a = barabasi_albert(n, m_attach, seed=1)
        b = barabasi_albert(n, m_attach, seed=2)
        assert not np.array_equal(a, b)


def test_ba_has_hubs():
    from repro.graph.csr import CSRGraph

    g = CSRGraph.from_edges(barabasi_albert(500, 3, seed=0))
    # Scale-free: max degree far above the mean.
    assert g.degrees.max() > 4 * g.degrees.mean()


def test_ba_rejects_bad_args():
    with pytest.raises(ValueError):
        barabasi_albert(3, 3)
    with pytest.raises(ValueError):
        barabasi_albert(10, 0)


@pytest.mark.parametrize("n", [50, 200, 1039])
def test_ring_with_shortcuts_shape(n):
    e = ring_with_shortcuts(n, seed=2)
    _check_canonical(e)
    assert is_connected_edges(e, n)
    assert n <= len(e) <= n + n // 4  # ring + at most n/4 chords


def test_ring_high_diameter():
    from repro.graph.csr import CSRGraph, estimate_diameter

    g = CSRGraph.from_edges(ring_with_shortcuts(400, n_shortcuts=10, seed=0), 400)
    assert estimate_diameter(g) > 15  # road-like regime, unlike BA


@pytest.mark.parametrize("n,k", [(30, 4), (80, 6), (62, 4)])
def test_watts_strogatz(n, k):
    e = watts_strogatz(n, k, 0.2, seed=5)
    _check_canonical(e)
    assert is_connected_edges(e, n)


def test_watts_strogatz_rejects_odd_k():
    with pytest.raises(ValueError):
        watts_strogatz(30, 3, 0.1)


@pytest.mark.parametrize("rows,cols", [(3, 3), (5, 7), (7, 7)])
def test_grid2d(rows, cols):
    e = grid2d(rows, cols)
    _check_canonical(e)
    assert is_connected_edges(e, rows * cols)
    assert len(e) == rows * (cols - 1) + cols * (rows - 1)


def test_erdos_renyi_connected_by_construction():
    e = erdos_renyi(60, 0.02, seed=3)  # below the connectivity threshold
    assert is_connected_edges(e, 60)


class TestKarate:
    def test_size(self):
        e = karate_club()
        assert len(e) == 78
        assert int(e.max()) == 33

    def test_known_degrees(self):
        from repro.graph.csr import CSRGraph

        g = CSRGraph.from_edges(karate_club(), 34)
        assert g.degrees[33] == 17  # instructor
        assert g.degrees[0] == 16  # president
        assert int(g.degrees.sum()) == 2 * 78


@pytest.mark.parametrize("name,n", [("zebra", 23), ("karate", 34), ("contusa", 49), ("dolphins", 62)])
def test_tiny_graphs(name, n):
    e, n_out = tiny_graph(name)
    assert n_out == n
    assert is_connected_edges(e, n)


def test_tiny_graph_unknown():
    with pytest.raises(ValueError):
        tiny_graph("nope")
