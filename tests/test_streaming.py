"""Streaming partitioner unit tests (HDRF / Greedy / random, §3.3)."""
import numpy as np
import pytest

from repro.core.streaming import StreamState, partition_streaming, stream_edges

from .conftest import star_graph, tiny_graph


def test_hdrf_beats_random_quality():
    el = tiny_graph("OK")
    rf_h = partition_streaming(el, k=16, method="hdrf").replication_factor()
    rf_r = partition_streaming(el, k=16, method="random").replication_factor()
    assert rf_h < rf_r


def test_greedy_beats_random_quality():
    el = tiny_graph("OK")
    rf_g = partition_streaming(el, k=16, method="greedy").replication_factor()
    rf_r = partition_streaming(el, k=16, method="random").replication_factor()
    assert rf_g < rf_r


def test_hdrf_respects_capacity():
    el = tiny_graph("TW")
    alpha = 1.05
    res = partition_streaming(el, k=8, method="hdrf", alpha=alpha)
    assert res.sizes.max() <= np.ceil(alpha * el.m / 8)


def test_hdrf_deterministic():
    el = tiny_graph("LJ")
    a = partition_streaming(el, k=8, method="hdrf")
    b = partition_streaming(el, k=8, method="hdrf")
    assert np.array_equal(a.assignment, b.assignment)


def test_random_seed_changes_assignment():
    el = tiny_graph("LJ")
    a = partition_streaming(el, k=8, method="random", seed=1)
    b = partition_streaming(el, k=8, method="random", seed=2)
    assert not np.array_equal(a.assignment[:, 2], b.assignment[:, 2])


def test_unknown_method_raises():
    el = star_graph(3)
    with pytest.raises(ValueError):
        partition_streaming(el, k=2, method="nope")


def test_replicas_match_assignment_coverage():
    """For pure streaming the replica sets equal the covered sets."""
    el = tiny_graph("WI")
    res = partition_streaming(el, k=8, method="hdrf")
    assert np.array_equal(res.replicas, res.covered())


def test_warm_start_attracts_edges():
    """An edge whose endpoints are already replicated on partition 0
    must be assigned there by HDRF when loads are level."""
    state = StreamState(n=4, k=3)
    state.replicas[0, 1] = True
    state.replicas[0, 2] = True
    degrees = np.array([1, 2, 2, 1])
    pids = stream_edges(
        np.array([[1, 2]]), state=state, degrees=degrees, cap=10, method="hdrf"
    )
    assert pids[0] == 0


def test_hdrf_balance_term_spreads_load():
    """With no replication signal, HDRF must spread edges (balance term
    dominates): a stream of disjoint edges lands on distinct partitions."""
    state = StreamState(n=8, k=4)
    edges = np.array([[0, 1], [2, 3], [4, 5], [6, 7]])
    degrees = np.ones(8)
    pids = stream_edges(edges, state=state, degrees=degrees, cap=10, method="hdrf")
    assert len(set(pids.tolist())) == 4


def test_capacity_overflow_fallback():
    """When every partition is at cap, the least-loaded one is used
    rather than dropping the edge."""
    el = star_graph(10)
    res = partition_streaming(el, k=3, method="hdrf", alpha=1.0)
    assert res.assignment.shape[0] == el.m


def test_stream_state_shared_mutation():
    state = StreamState(n=4, k=2)
    stream_edges(
        np.array([[0, 1]]), state=state, degrees=np.ones(4), cap=5, method="hdrf"
    )
    assert state.sizes.sum() == 1
    assert state.replicas.any()
