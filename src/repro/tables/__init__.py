"""Experiment harnesses: one module per paper table/figure, plus the
Spark fan-out runner that executes (graph, algorithm) simulation cells
in parallel via ``applyInPandas``."""
