"""Graph substrate: synthetic power-law corpus, Spark degree/τ-split
jobs, and the CSR / pruned-CSR representation (paper §3.2.1)."""
from .generators import GRAPH_NAMES, EdgeList, graph, graph_type, to_spark  # noqa: F401
