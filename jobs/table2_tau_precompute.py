"""Table 2 reproduction: run-time of the τ memory-footprint pre-compute.

Usage: spark-submit jobs/table2_tau_precompute.py [scale]
"""
import sys

from _session import get_spark

from repro.harness import print_rows, run_table2


def main(scale: float = 1.0) -> None:
    spark = get_spark("table2")
    rows = run_table2(spark, scale=scale)
    print_rows("Table 2 (τ pre-compute run-time)", rows)


if __name__ == "__main__":
    main(float(sys.argv[1]) if len(sys.argv) > 1 else 1.0)
