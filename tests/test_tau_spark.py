"""τ pre-computation (Table 2 machinery): Spark sweep vs numpy model."""
import numpy as np
import pytest

from repro.core.memory_model import hep_footprint_bytes
from repro.graphs.generators import to_spark
from repro.tau.precompute import footprint_sweep, max_tau_within

from .conftest import tiny_graph

TAUS = [0.5, 1.0, 2.0, 10.0, 100.0]


@pytest.mark.parametrize("name", ["OK", "IT"])
def test_sweep_matches_memory_model(spark, name):
    el = tiny_graph(name)
    deg = el.degrees().astype(np.int64)
    got = footprint_sweep(to_spark(spark, el), taus=TAUS, k=32)
    for tau, b in got:
        assert b == hep_footprint_bytes(deg, tau=tau, k=32)


def test_sweep_monotone(spark):
    el = tiny_graph("OK")
    got = footprint_sweep(to_spark(spark, el), taus=TAUS, k=32)
    sizes = [b for _, b in got]
    assert sizes == sorted(sizes)


def test_max_tau_within_budget(spark):
    el = tiny_graph("OK")
    edges = to_spark(spark, el)
    sweep = footprint_sweep(edges, taus=TAUS, k=32)
    mid = sweep[len(sweep) // 2][1]
    best = max_tau_within(edges, taus=TAUS, k=32, budget_bytes=mid)
    assert best is not None
    assert dict(sweep)[best] <= mid
    # and it is maximal among candidates that fit
    for t, b in sweep:
        if b <= mid:
            assert t <= best


def test_max_tau_none_when_budget_tiny(spark):
    el = tiny_graph("OK")
    assert (
        max_tau_within(to_spark(spark, el), taus=TAUS, k=32, budget_bytes=16)
        is None
    )


def test_single_pass_many_taus(spark):
    """The sweep is one aggregation regardless of the τ-grid size."""
    el = tiny_graph("LJ")
    taus = list(np.linspace(0.5, 50, 25))
    got = footprint_sweep(to_spark(spark, el), taus=taus, k=8)
    assert len(got) == 25
