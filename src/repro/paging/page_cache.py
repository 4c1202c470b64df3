"""LRU page-cache simulation of NE++ under memory limits (Table 6).

The paper restricts NE++'s memory with cgroups and an SSD swap device,
then counts hard page faults. The sandbox has neither cgroup delegation
nor swap (DESIGN.md substitution 3), so we reproduce the *measured
quantity* directly: the CSR exposes a ``touch(byte_lo, byte_hi)`` hook
on every column-array access, and this module replays those touches
against an LRU cache of 4 KiB pages sized to the memory limit minus
HEP's fixed structures (§4.2). A miss on a never-seen page is a
compulsory load (the initial file read — not a fault); a miss on a
previously-resident page is a **hard page fault**. Run-time is modeled
as measured compute time + faults × SSD latency.
"""
from __future__ import annotations

from collections import OrderedDict
from dataclasses import dataclass

PAGE_SIZE = 4096
SSD_FAULT_SECONDS = 100e-6  # ~100 µs per 4 KiB hard fault from SSD swap


class LruPageCache:
    """LRU page cache over byte-range touches."""

    def __init__(self, capacity_bytes: int):
        self.capacity_pages = max(1, -(-capacity_bytes // PAGE_SIZE))
        self._lru: OrderedDict[int, None] = OrderedDict()
        self._seen: set[int] = set()
        self.hits = 0
        self.compulsory = 0
        self.hard_faults = 0

    def touch(self, byte_lo: int, byte_hi: int) -> None:
        """Access the half-open byte range [byte_lo, byte_hi)."""
        lru = self._lru
        for page in range(byte_lo // PAGE_SIZE, (byte_hi - 1) // PAGE_SIZE + 1):
            if page in lru:
                lru.move_to_end(page)
                self.hits += 1
                continue
            if page in self._seen:
                self.hard_faults += 1
            else:
                self._seen.add(page)
                self.compulsory += 1
            lru[page] = None
            if len(lru) > self.capacity_pages:
                lru.popitem(last=False)


@dataclass
class PagingRun:
    """One row of the Table 6 reproduction."""

    limit_bytes: int
    hard_faults: int
    compulsory: int
    compute_s: float
    modeled_runtime_s: float


def run_nepp_paged(el, *, k: int, tau: float, limit_bytes: int) -> PagingRun:
    """Run NE++ with the column array behind an LRU cache of
    ``limit_bytes`` minus the fixed §4.2 structures."""
    import time

    from ..core.memory_model import hep_footprint_bytes
    from ..core.nepp import partition_nepp
    from ..graphs.csr import build_pruned_csr

    deg = el.degrees().astype("int64")
    # only the column array pages; the §4.2 fixed structures are pinned
    fixed = hep_footprint_bytes(deg, tau=tau, k=k) - _col_bytes(deg, tau)
    cache = LruPageCache(max(PAGE_SIZE, limit_bytes - fixed))
    csr = build_pruned_csr(el, tau=tau)
    csr.touch = cache.touch
    t0 = time.perf_counter()
    partition_nepp(el, k=k, tau=tau, csr=csr)
    compute = time.perf_counter() - t0
    return PagingRun(
        limit_bytes=limit_bytes,
        hard_faults=cache.hard_faults,
        compulsory=cache.compulsory,
        compute_s=compute,
        modeled_runtime_s=compute + cache.hard_faults * SSD_FAULT_SECONDS,
    )


def _col_bytes(deg, tau: float) -> int:
    from ..graphs.csr import ID_BYTES
    from ..graphs.degrees import high_mask_np

    high = high_mask_np(deg, tau)
    return int(deg[~high].sum()) * ID_BYTES
