"""Table 5 bench: HEP vertex balancing improves as τ drops."""
from repro.harness import print_rows, run_table5

from ._scales import BENCH_SCALE, K


def test_bench_table5(benchmark):
    rows = benchmark.pedantic(
        lambda: run_table5(scale=BENCH_SCALE, k=K), rounds=1, iterations=1
    )
    print_rows(f"Table 5 (vertex balancing, k={K})", rows)
    by = {(r["graph"], r["partitioner"]): r["vertex_balance"] for r in rows}
    # paper's shape: more streaming (lower τ) ⇒ better vertex balance.
    # Strongly reproduced on the social analogs (OK, TW); on the IT
    # *analog* the trend is flat-to-inverted (host-hub structure differs
    # from the real IT crawl) — see EXPERIMENTS.md, so IT only gets a
    # generous slack bound here.
    for g in ("OK", "TW"):
        assert by[(g, "HEP-1")] <= by[(g, "HEP-100")] * 1.1
    assert by[("IT", "HEP-1")] <= by[("IT", "HEP-100")] * 2.0
