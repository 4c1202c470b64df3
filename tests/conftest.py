"""Shared test fixtures: small cached analog graphs.

Graphs are generated once per session (deterministic seeds) and shared;
tests must not mutate them. CSR-consuming tests build their own CSR.
"""
from __future__ import annotations

from functools import lru_cache

import numpy as np
import pytest

from repro.graphs.generators import EdgeList, graph

# tiny scale for unit tests: hundreds to a few thousand edges
TEST_SCALE = 0.02
TEST_GRAPHS = ("LJ", "OK", "BR", "WI", "IT", "TW")


@lru_cache(maxsize=None)
def tiny_graph(name: str, scale: float = TEST_SCALE) -> EdgeList:
    return graph(name, scale=scale)


@pytest.fixture(autouse=True)
def _results_dir_to_tmp(tmp_path, monkeypatch):
    """Keep harness print_rows artifacts out of the repo's
    bench_results/ during unit tests (that dir belongs to bench runs)."""
    monkeypatch.setenv("REPRO_RESULTS_DIR", str(tmp_path / "bench_results"))


@pytest.fixture(params=TEST_GRAPHS)
def any_graph(request) -> EdgeList:
    """One of the six analog graphs at test scale."""
    return tiny_graph(request.param)


@pytest.fixture
def ok_graph() -> EdgeList:
    return tiny_graph("OK")


@pytest.fixture
def it_graph() -> EdgeList:
    return tiny_graph("IT")


def star_graph(n_leaves: int = 6) -> EdgeList:
    """The paper's Figure 1 star: vertex 0 in the middle."""
    edges = np.array([[0, i] for i in range(1, n_leaves + 1)], dtype=np.uint32)
    return EdgeList(edges=edges, n=n_leaves + 1)


def path_graph(n: int) -> EdgeList:
    edges = np.array([[i, i + 1] for i in range(n - 1)], dtype=np.uint32)
    return EdgeList(edges=edges, n=n)


def two_triangles() -> EdgeList:
    """Two disconnected triangles — exercises re-initialization."""
    edges = np.array(
        [[0, 1], [1, 2], [2, 0], [3, 4], [4, 5], [5, 3]], dtype=np.uint32
    )
    return EdgeList(edges=edges, n=6)
