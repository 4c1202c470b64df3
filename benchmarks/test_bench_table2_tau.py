"""Table 2 bench: τ-footprint pre-compute run-time per graph."""
from repro.harness import print_rows, run_table2

from ._scales import BENCH_SCALE


def test_bench_table2(spark, benchmark):
    rows = benchmark.pedantic(
        lambda: run_table2(spark, scale=BENCH_SCALE), rounds=1, iterations=1
    )
    print_rows("Table 2 (τ pre-compute run-time)", rows)
    # negligible vs partitioning (paper's point): all sub-minute here
    assert all(r["seconds"] < 60 for r in rows)
