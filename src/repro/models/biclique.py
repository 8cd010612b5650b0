"""Maximal biclique containing the query vertex (paper ref [20]).

Table II uses "a maximal biclique containing q with at least s vertices in
each layer". Exact maximal-biclique enumeration is exponential; since the
case study only needs the *statistics of one* such biclique, we use a
greedy heuristic (documented in DESIGN.md §4):

1. restrict to q's 2-hop neighbourhood by dataflow joins (any biclique
   containing q lives there: its L side ⊆ N(q), its U side ⊆ N(N(q)));
2. collect that bounded subgraph to the driver;
3. greedily grow the U side, always adding the candidate that keeps the
   common-neighbourhood (the L side) largest, while it can stay >= s;
4. maximalise: add every remaining vertex adjacent to the whole other side.

The result is a maximal biclique containing q (possibly below the s target
if none exists — callers see the actual sizes).
"""
from __future__ import annotations

from collections import defaultdict

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def maximal_biclique(
    edges: DataFrame, q: int, qside: str, min_side: int
) -> tuple[list[int], list[int]]:
    """A maximal biclique containing q, as ``(upper_ids, lower_ids)``.

    Returns ``([], [])`` when q is isolated.
    """
    # Work with q on the upper layer; mirror back at the end if needed.
    e = edges if qside == "u" else edges.select(
        F.col("v").alias("u"), F.col("u").alias("v"), "w"
    )
    nq = e.where(F.col("u") == q).select("v")
    two_hop = e.join(nq, "v", "semi")  # edges into N(q) from any candidate u
    rows = two_hop.select("u", "v").collect()
    if not rows:
        return ([], [])
    adj: dict[int, set[int]] = defaultdict(set)
    for r in rows:
        adj[int(r["u"])].add(int(r["v"]))

    us = [q]
    common = set(adj[q])
    cands = {u for u in adj if u != q}
    while True:
        best_u, best_inter = None, None
        for u in cands:
            inter = common & adj[u]
            if len(inter) >= min_side and (
                best_inter is None or len(inter) > len(best_inter)
            ):
                best_u, best_inter = u, inter
        if best_u is None:
            break
        us.append(best_u)
        common = best_inter
        cands.discard(best_u)
        cands = {u for u in cands if len(common & adj[u]) >= min_side}
    # Maximalise the U side: adopt every vertex adjacent to all of `common`.
    for u in sorted(set(adj) - set(us)):
        if common <= adj[u]:
            us.append(u)
    uppers, lowers = sorted(us), sorted(common)
    return (uppers, lowers) if qside == "u" else (lowers, uppers)


def biclique_edges(
    edges: DataFrame, uppers: list[int], lowers: list[int]
) -> DataFrame:
    """Edge DataFrame of the biclique (for the shared stats code path)."""
    spark = edges.sparkSession
    us = spark.createDataFrame([(int(u),) for u in uppers] or [], "u long")
    vs = spark.createDataFrame([(int(v),) for v in lowers] or [], "v long")
    return edges.join(us, "u", "semi").join(vs, "v", "semi")
