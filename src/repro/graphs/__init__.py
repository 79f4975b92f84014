"""Graph substrate: CSR structures, synthetic generators for all 25
paper graph families, the scaled benchmark suite, and Spark DataFrame
graph operations."""

from repro.graphs.csr import CSR, build_csr, from_edge_list  # noqa: F401
