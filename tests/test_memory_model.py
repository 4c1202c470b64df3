"""§4.2 memory model + paging simulator unit tests."""
import numpy as np
import pytest

from repro.core.memory_model import (
    hep_footprint_bytes,
    ne_footprint_bytes,
    streaming_footprint_bytes,
)
from repro.graphs.csr import ID_BYTES, build_pruned_csr
from repro.paging.page_cache import PAGE_SIZE, LruPageCache, run_nepp_paged

from .conftest import TEST_GRAPHS, tiny_graph


@pytest.mark.parametrize("name", TEST_GRAPHS)
def test_hep_footprint_monotone_in_tau(name):
    deg = tiny_graph(name).degrees().astype(np.int64)
    sizes = [hep_footprint_bytes(deg, tau=t, k=32) for t in (0.5, 1.0, 10.0, 100.0)]
    assert sizes == sorted(sizes)


@pytest.mark.parametrize("name", TEST_GRAPHS)
def test_hep_footprint_below_ne(name):
    """HEP's model must undercut NE's at any τ (the paper's memory
    axis: in-memory partitioners use up to an order of magnitude more)."""
    deg = tiny_graph(name).degrees().astype(np.int64)
    k = 32
    assert hep_footprint_bytes(deg, tau=1.0, k=k) < ne_footprint_bytes(deg, k=k)


def test_footprint_formula_terms():
    """Hand-checked formula on a known degree vector, τ high (no
    pruning): Σd(v)·4 + 6·n·4 + ceil(n·(k+1)/8)."""
    deg = np.array([2, 2, 4, 4], dtype=np.int64)
    k = 7
    want = 12 * ID_BYTES + 6 * 4 * ID_BYTES + int(np.ceil(4 * 8 / 8))
    assert hep_footprint_bytes(deg, tau=100.0, k=k) == want


def test_footprint_column_term_matches_pruned_csr():
    """The Σ_{v∈V_l} d(v) term equals the pruned column array size."""
    el = tiny_graph("OK")
    deg = el.degrees().astype(np.int64)
    tau, k = 1.0, 8
    csr = build_pruned_csr(el, tau=tau)
    col_bytes = csr.col_entries * ID_BYTES
    fixed = 6 * el.n * ID_BYTES + int(np.ceil(el.n * (k + 1) / 8))
    assert hep_footprint_bytes(deg, tau=tau, k=k) == col_bytes + fixed


def test_streaming_footprint_smallest():
    el = tiny_graph("OK")
    deg = el.degrees().astype(np.int64)
    k = 32
    assert streaming_footprint_bytes(el.n, k=k) < hep_footprint_bytes(deg, tau=1.0, k=k)


# --- LRU page cache ----------------------------------------------------

def test_lru_no_faults_when_fits():
    c = LruPageCache(10 * PAGE_SIZE)
    for _ in range(3):
        for p in range(5):
            c.touch(p * PAGE_SIZE, (p + 1) * PAGE_SIZE)
    assert c.hard_faults == 0
    assert c.compulsory == 5


def test_lru_faults_on_eviction_cycle():
    c = LruPageCache(2 * PAGE_SIZE)
    for _ in range(2):
        for p in range(4):  # cyclic over 4 pages with room for 2
            c.touch(p * PAGE_SIZE, (p + 1) * PAGE_SIZE)
    assert c.compulsory == 4
    assert c.hard_faults == 4  # every revisit misses under LRU + cyclic


def test_lru_range_spanning_pages():
    c = LruPageCache(10 * PAGE_SIZE)
    c.touch(0, 3 * PAGE_SIZE)  # touches pages 0,1,2
    assert c.compulsory == 3


def test_paged_nepp_fault_monotonicity():
    """Table 6 shape: tighter memory ⇒ (weakly) more hard faults."""
    el = tiny_graph("OK")
    deg = el.degrees().astype(np.int64)
    full = hep_footprint_bytes(deg, tau=100.0, k=8)
    faults = [
        run_nepp_paged(el, k=8, tau=100.0, limit_bytes=int(full * f)).hard_faults
        for f in (1.0, 0.5, 0.25)
    ]
    assert faults[0] <= faults[1] <= faults[2]


def test_paged_nepp_zero_faults_with_slack():
    el = tiny_graph("LJ")
    deg = el.degrees().astype(np.int64)
    full = hep_footprint_bytes(deg, tau=100.0, k=8)
    r = run_nepp_paged(el, k=8, tau=100.0, limit_bytes=full * 4)
    assert r.hard_faults == 0
    assert r.modeled_runtime_s == pytest.approx(r.compute_s)
