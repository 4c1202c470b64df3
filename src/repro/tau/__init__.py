"""τ pre-computation: one-pass Spark footprint sweep (Table 2, §4.4)."""
from .precompute import footprint_sweep, max_tau_within  # noqa: F401
