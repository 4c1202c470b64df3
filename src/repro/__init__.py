"""Reproduction of "Hybrid Edge Partitioner" (Mayer & Jacobsen,
SIGMOD 2021) — see DESIGN.md for the system map and EXPERIMENTS.md for
the table-by-table paper-vs-measured comparison."""
