"""Distributed sparse linear algebra over Spark DataFrames.

This is the dataflow substrate the whole reproduction runs on: n x k "belief"
matrices are DataFrames ``(node, c0..c{k-1})``, the adjacency matrix is a
symmetric edges DataFrame, and every product the paper factorizes (``W N``,
``N H``, ``X^T N``) is a Catalyst-planned join/aggregation.
"""
