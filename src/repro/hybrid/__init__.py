"""Hybrid RA-LA micro-benchmark substrate (paper §9.2.2): synthetic
Twitter-like / MIMIC-like relational data, SparkSQL preprocessing that
constructs the M and N matrices, RA view reuse and LA-to-RA selection
pushdown, and the P3.x analysis pipelines of Table 7."""
