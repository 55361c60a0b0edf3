"""Spark DataFrame linear-algebra substrate: matrices in COO form
``(i, j, v)``, operators compiled to Catalyst joins/aggregations."""
