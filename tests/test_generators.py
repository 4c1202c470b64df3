"""Unit tests for the synthetic graph corpus (Table 3 substrate)."""
import numpy as np
import pytest

from repro.graphs.generators import (
    GRAPH_NAMES,
    dense_communities,
    graph,
    graph_type,
    rmat,
    to_pandas,
    web_locality,
)

from .conftest import TEST_GRAPHS, tiny_graph


@pytest.mark.parametrize("name", TEST_GRAPHS)
class TestCorpusInvariants:
    def test_no_self_loops(self, name):
        el = tiny_graph(name)
        assert (el.edges[:, 0] != el.edges[:, 1]).all()

    def test_no_duplicate_undirected_pairs(self, name):
        el = tiny_graph(name)
        lo = np.minimum(el.edges[:, 0], el.edges[:, 1]).astype(np.uint64)
        hi = np.maximum(el.edges[:, 0], el.edges[:, 1]).astype(np.uint64)
        key = (lo << np.uint64(32)) | hi
        assert len(np.unique(key)) == el.m

    def test_compact_vertex_ids(self, name):
        el = tiny_graph(name)
        seen = np.unique(el.edges)
        assert seen[0] == 0 and seen[-1] == el.n - 1
        assert len(seen) == el.n  # every id 0..n-1 is incident to an edge

    def test_deterministic(self, name):
        a = graph(name, scale=0.01)
        b = graph(name, scale=0.01)
        assert a.n == b.n
        assert np.array_equal(a.edges, b.edges)

    def test_degrees_sum_to_2m(self, name):
        el = tiny_graph(name)
        assert el.degrees().sum() == 2 * el.m

    def test_size_bytes_is_binary_edge_list(self, name):
        el = tiny_graph(name)
        assert el.size_bytes == 8 * el.m  # two 32-bit ids per edge

    def test_scale_grows_edge_count(self, name):
        small = graph(name, scale=0.01)
        large = graph(name, scale=0.04)
        assert large.m > small.m


@pytest.mark.parametrize("name", [g for g in TEST_GRAPHS if g != "BR"])
def test_degree_skew_present(name):
    """Social/web analogs are skewed: the top-1% vertices carry far more
    than 1% of edge endpoints (power-law-ish tail, paper §2 Graph
    Type). BR is exempt — the brain graph is dense, not power-law."""
    el = tiny_graph(name)
    deg = np.sort(el.degrees())[::-1]
    top = max(1, el.n // 100)
    share = deg[:top].sum() / deg.sum()
    assert share > 0.05, f"{name}: top-1% share {share:.3f} too flat"


def test_social_analogs_more_skewed_than_web():
    """RMAT social analogs have heavier max-degree tails (relative to
    mean) than the host-locality web analogs' page-level structure."""
    tw = tiny_graph("TW")
    it = tiny_graph("IT")
    skew = lambda el: el.degrees().max() / el.degrees().mean()
    assert skew(tw) > 3.0


@pytest.mark.parametrize("name", GRAPH_NAMES)
def test_graph_type_labels(name):
    assert graph_type(name) in {"Social", "Web", "Biological"}


def test_rmat_respects_id_space():
    el = rmat(scale=8, n_edges=500, seed=1)
    assert el.n <= 256
    assert el.m <= 500


def test_rmat_different_seeds_differ():
    a = rmat(scale=10, n_edges=1000, seed=1)
    b = rmat(scale=10, n_edges=1000, seed=2)
    assert a.m != b.m or not np.array_equal(a.edges, b.edges)


def test_web_locality_mostly_intra_host():
    el = web_locality(n_hosts=50, mean_host_size=10.0, n_edges=2000, p_intra=0.9, seed=3)
    assert el.m > 500


def test_dense_communities_high_mean_degree():
    el = dense_communities(n=200, n_comms=5, n_edges=5000, seed=4)
    assert el.degrees().mean() > 10


def test_brain_analog_denser_than_social():
    br = tiny_graph("BR")
    ok = tiny_graph("OK")
    assert br.degrees().mean() > ok.degrees().mean()


def test_to_pandas_roundtrip():
    el = tiny_graph("OK")
    pdf = to_pandas(el)
    assert list(pdf.columns) == ["src", "dst"]
    assert len(pdf) == el.m
    assert (pdf["src"].to_numpy() == el.edges[:, 0]).all()


def test_unknown_graph_raises():
    with pytest.raises(KeyError):
        graph("NOPE")
