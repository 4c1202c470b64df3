"""Table 3 bench: corpus generation + statistics."""
from repro.harness import print_rows, run_table3

from ._scales import BENCH_SCALE


def test_bench_table3(benchmark):
    rows = benchmark.pedantic(
        lambda: run_table3(scale=BENCH_SCALE), rounds=1, iterations=1
    )
    print_rows("Table 3 (analog graph corpus)", rows)
    by = {r["graph"]: r for r in rows}
    # corpus ordering mirrors the paper: UK largest web graph, BR densest
    assert by["UK"]["edges"] > by["IT"]["edges"] > by["OK"]["edges"]
    assert by["BR"]["mean_degree"] == max(r["mean_degree"] for r in rows)
