"""Community statistics for the Table II case study.

For a community edge DataFrame: |U| (users), |M| (movies), R_avg / R_min
(average / minimum rating), M_avg (average movies per user = |E| / |U|) and
Sim (Jaccard similarity of the vertex set against a reference community —
the paper compares every model against SC).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class CommunityStats:
    n_u: int
    n_m: int
    r_avg: float
    r_min: float
    m_avg: float
    sim: float  # Jaccard vs the reference vertex set, in [0, 1]


def vertex_set(community: DataFrame) -> set[tuple[str, int]]:
    """The community's vertex set in the shared (side, id) namespace."""
    rows = community.select(
        F.col("u").alias("uid"), F.col("v").alias("vid")
    ).collect()
    out: set[tuple[str, int]] = set()
    for r in rows:
        out.add(("u", int(r["uid"])))
        out.add(("v", int(r["vid"])))
    return out


def community_stats(
    community: DataFrame, reference: set[tuple[str, int]] | None = None
) -> CommunityStats:
    """Compute the Table II statistics row for one community."""
    row = community.agg(
        F.count(F.lit(1)).alias("m"),
        F.countDistinct("u").alias("n_u"),
        F.countDistinct("v").alias("n_m"),
        F.avg("w").alias("r_avg"),
        F.min("w").alias("r_min"),
    ).first()
    m, n_u, n_m = int(row["m"]), int(row["n_u"]), int(row["n_m"])
    if m == 0:
        return CommunityStats(0, 0, float("nan"), float("nan"), float("nan"), 0.0)
    sim = 1.0
    if reference is not None:
        mine = vertex_set(community)
        inter = len(mine & reference)
        union = len(mine | reference)
        sim = inter / union if union else 0.0
    return CommunityStats(
        n_u=n_u,
        n_m=n_m,
        r_avg=float(row["r_avg"]),
        r_min=float(row["r_min"]),
        m_avg=m / n_u,
        sim=sim,
    )
