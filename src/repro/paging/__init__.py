"""LRU page-cache simulation of memory-restricted NE++ (Table 6)."""
from .page_cache import LruPageCache, PagingRun, run_nepp_paged  # noqa: F401
