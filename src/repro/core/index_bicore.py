"""Bicore-index baseline ``I_v`` (Liu et al., WWW'19 [15]).

The bicore index answers "give me the *vertex set* of the (α,β)-core" in
optimal time but stores no edges, so the query ``Q_v`` must afterwards
re-scan the graph's edge list to materialise the community — the
extra-edge-touching cost the paper's ``I_δ`` eliminates.

Our analogue stores vertex offsets only, degeneracy-bounded like the
original (O(m)-ish): rows ``(kind, tau, side, id, off)`` where kind ``a``
holds ``s_a(·,τ) >= τ`` and kind ``b`` holds ``s_b(·,τ) > τ`` for
τ in [1, δ]. ``V(R_αβ) = {x : s_a(x,α) >= β}`` (α <= β) or the symmetric
β-side lookup.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.decomposition import alpha_offsets, beta_offsets, coreness, delta


def build_iv(edges: DataFrame, *, delta_val: int | None = None) -> DataFrame:
    """Construct ``I_v`` (see module doc for schema)."""
    d = delta_val if delta_val is not None else delta(edges, coreness_df=coreness(edges))
    spark = edges.sparkSession
    schema = "kind string, tau int, side string, id long, off int"
    if d == 0:
        return spark.createDataFrame([], schema)
    taus = range(1, d + 1)
    sa = alpha_offsets(edges, taus).where(F.col("off") >= F.col("alpha"))
    sb = beta_offsets(edges, taus).where(F.col("off") > F.col("beta"))
    part_a = sa.select(
        F.lit("a").alias("kind"), F.col("alpha").alias("tau"), "side", "id", "off"
    )
    part_b = sb.select(
        F.lit("b").alias("kind"), F.col("beta").alias("tau"), "side", "id", "off"
    )
    return part_a.unionByName(part_b)


def core_vertices(iv: DataFrame, alpha: int, beta: int) -> DataFrame:
    """``V(R_αβ)`` as ``(side, id)`` via the index (empty if min(α,β) > δ)."""
    if alpha <= beta:
        return iv.where(
            (F.col("kind") == "a") & (F.col("tau") == alpha) & (F.col("off") >= beta)
        ).select("side", "id")
    return iv.where(
        (F.col("kind") == "b") & (F.col("tau") == beta) & (F.col("off") >= alpha)
    ).select("side", "id")
