"""SNE (streaming NE) unit tests."""
import numpy as np
import pytest

from repro.core.common import check_valid
from repro.core.sne import partition_sne

from .conftest import TEST_GRAPHS, tiny_graph, two_triangles


@pytest.mark.parametrize("name", TEST_GRAPHS)
@pytest.mark.parametrize("k", [4, 16])
def test_sne_valid(name, k):
    el = tiny_graph(name)
    check_valid(el, partition_sne(el, k=k), alpha=1.25)


def test_sne_deterministic():
    el = tiny_graph("WI")
    a = partition_sne(el, k=8)
    b = partition_sne(el, k=8)
    assert np.array_equal(a.assignment, b.assignment)


def test_sne_disconnected():
    el = two_triangles()
    check_valid(el, partition_sne(el, k=2), alpha=1.5)


def test_larger_buffer_helps_quality():
    """More buffered context ⇒ better (≤) replication factor."""
    el = tiny_graph("OK")
    rf_small = partition_sne(el, k=16, sample_size=1.0).replication_factor()
    rf_big = partition_sne(el, k=16, sample_size=8.0).replication_factor()
    assert rf_big <= rf_small * 1.05


def test_sne_balance():
    """SNE stops a partition after the expansion step that crosses cap,
    so sizes may overshoot by one step — bounded here by α=1.1."""
    el = tiny_graph("OK")
    res = partition_sne(el, k=8)
    cap = -(-el.m // 8)
    assert (res.sizes <= 1.1 * cap).all()
