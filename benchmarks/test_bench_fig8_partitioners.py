"""Fig. 8 bench (extra): RF / run-time / modeled memory across the full
partitioner lineup on six analog graphs."""
from repro.harness import print_rows, run_fig8

from ._scales import BENCH_SCALE, K


def test_bench_fig8(benchmark):
    rows = benchmark.pedantic(
        lambda: run_fig8(scale=0.5 * BENCH_SCALE, k=K), rounds=1, iterations=1
    )
    print_rows(f"Fig. 8 (partitioner comparison, k={K})", rows)
    by = {(r["graph"], r["partitioner"]): r for r in rows}
    for g in ("LJ", "OK", "WI", "IT", "TW"):
        # memory knob: HEP-1 model ≪ NE model
        assert by[(g, "HEP-1")]["mem_model_mib"] < by[(g, "NE")]["mem_model_mib"]
        # quality: HEP-10 beats every pure streaming baseline
        for s in ("HDRF", "DBH", "Random", "Greedy"):
            assert by[(g, "HEP-10")]["rf"] <= by[(g, s)]["rf"] * 1.1
