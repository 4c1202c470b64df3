"""Table 6 bench: paged NE++ vs HEP-1 on the OK analog."""
from repro.harness import print_rows, run_table6

from ._scales import BENCH_SCALE, K


def test_bench_table6(benchmark):
    rows = benchmark.pedantic(
        lambda: run_table6(scale=BENCH_SCALE, k=K), rounds=1, iterations=1
    )
    print_rows(f"Table 6 (paging, OK analog, k={K})", rows)
    ladder = [r for r in rows if r["limit_frac"] != "HEP-1"]
    faults = [r["hard_faults"] for r in ladder]
    assert faults == sorted(faults), "faults must grow as memory shrinks"
    assert faults[-1] > faults[0], "restriction must induce faults"
    hep = rows[-1]
    # HEP's alternative: smaller footprint than every restricted run yet
    # zero faults (the paper's pitch for hybrid over paging)
    assert hep["hard_faults"] == 0
    assert hep["limit_bytes"] < ladder[0]["limit_bytes"]
