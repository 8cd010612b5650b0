"""The ``C_4★`` community: induced subgraph of lower-layer vertices (movies)
whose average edge weight (rating) meets a threshold, restricted to q's
connected component — the structure-blind straw man of Table II.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.components import component_of


def high_rating_subgraph(edges: DataFrame, *, threshold: float = 4.0) -> DataFrame:
    """All edges incident to lower-layer vertices with avg weight >= threshold."""
    good_v = (
        edges.groupBy("v")
        .agg(F.avg("w").alias("avg_w"))
        .where(F.col("avg_w") >= threshold)
        .select("v")
    )
    return edges.join(good_v, "v", "semi")


def c4star_community(
    edges: DataFrame, q: int, qside: str, *, threshold: float = 4.0
) -> DataFrame:
    """Connected component of q within the high-average-rating subgraph."""
    return component_of(high_rating_subgraph(edges, threshold=threshold), q, qside)
