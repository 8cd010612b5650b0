"""The paper's contribution: (α,β)-community indexes and significant
(α,β)-community search.

* ``index_bs`` — basic indexes ``I_bs^α`` / ``I_bs^β`` (Section III-A).
* ``index_delta`` — degeneracy-bounded index ``I_δ`` (Section III-B).
* ``index_bicore`` — the bicore-index baseline ``I_v`` (Liu et al. [15]).
* ``query`` — ``Q_o`` (online), ``Q_v`` (bicore), ``Q_opt`` (I_δ), ``Q_bs``.
* ``scs`` — SCS-Peel / SCS-Expand / SCS-Baseline (Section IV).

Indexes are DataFrames persisted as Parquet partitioned by their slice
column; partition pruning at query time is the dataflow analogue of the
paper's result-size-optimal index traversal (DESIGN.md §2).
"""
