"""The paper's contribution as a PySpark DataFrame iterative vertex
program: the work-efficient framework (Alg. 1) with offline histogram
peeling, block-local VGC cascades, the sampling scheme, and the
max-k'-core-subgraph adaptation (Appendix B)."""
