"""Spark (distributed dataflow) implementations of the paper's algorithms.

Every module here has a driver-side numpy reference in ``repro.core`` /
``repro.graphs``; tests assert bit-identical results between the two
paths, and every Spark SQL aggregation is additionally checked against
DuckDB via ``repro.oracle.assert_equivalent``.
"""
