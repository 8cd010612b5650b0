"""Comparison cohesive-subgraph models used by the Table II case study:
k-bitruss (butterfly-based), maximal biclique containing q, and the
average-rating community ``C_4★``. Each returns the connected component of
the query vertex under its model, matching the paper's evaluation protocol.
"""
