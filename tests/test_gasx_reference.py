"""Sanity tests for the dense numpy references used to validate gasx."""
import numpy as np

from repro.gasx.reference import bfs_ref, cc_ref, pagerank_ref

from .conftest import path_graph, star_graph, tiny_graph, two_triangles


def test_pagerank_star_hub_dominates():
    el = star_graph(8)
    r = pagerank_ref(el, n_iter=20)
    assert r[0] == max(r)
    assert np.allclose(r[1:], r[1])  # leaves symmetric


def test_pagerank_conserves_total_on_regular_graph():
    """On a cycle every vertex has equal rank 1.0 (stationary)."""
    edges = np.array([[i, (i + 1) % 6] for i in range(6)], dtype=np.uint32)
    from repro.graphs.generators import EdgeList

    el = EdgeList(edges=edges, n=6)
    r = pagerank_ref(el, n_iter=30)
    assert np.allclose(r, 1.0)


def test_bfs_path_distances():
    el = path_graph(6)
    d = bfs_ref(el, source=0)
    assert d.tolist() == [0, 1, 2, 3, 4, 5]


def test_bfs_unreachable():
    el = two_triangles()
    d = bfs_ref(el, source=0)
    assert (d[:3] >= 0).all()
    assert (d[3:] == -1).all()


def test_cc_two_components():
    el = two_triangles()
    lbl = cc_ref(el)
    assert lbl.tolist() == [0, 0, 0, 3, 3, 3]


def test_cc_connected_graph_single_label():
    el = tiny_graph("OK")
    lbl = cc_ref(el)
    # analog graphs may have several components; each label must be the
    # min id of its component and labels must be closed under edges
    for a, b in el.edges[:500]:
        assert lbl[int(a)] == lbl[int(b)]
