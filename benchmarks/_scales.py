"""Bench-scale knobs (env-overridable).

REPRO_BENCH_SCALE scales every bench graph; 1.0 ≈ the corpus' nominal
bench size (a few hundred thousand edges per graph — the largest that
keeps the sequential partitioner cores in seconds-to-minutes on one
core, mirroring the paper's single-node partitioning setup).
"""
import os

BENCH_SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))
# Table 4 drives ~20 full gasx workloads; run its graphs a bit smaller.
T4_SCALE = float(os.environ.get("REPRO_T4_SCALE", str(0.3 * BENCH_SCALE)))
K = int(os.environ.get("REPRO_BENCH_K", "32"))
