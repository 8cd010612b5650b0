"""Shared test helpers: seeded random bipartite graphs, handcrafted fixtures,
and edge-set comparison utilities used across the suite."""
from __future__ import annotations

import numpy as np


def rand_bipartite(
    seed: int, *, n_u: int = 12, n_l: int = 10, m: int = 70, wlevels: int = 4
) -> list[tuple[int, int, float]]:
    """Small random bipartite edge list with integer weights in [1, wlevels]."""
    g = np.random.default_rng(seed)
    es = sorted(
        {
            (int(u), int(v))
            for u, v in zip(g.integers(0, n_u, m), g.integers(0, n_l, m))
        }
    )
    return [(u, v, float(g.integers(1, wlevels + 1))) for u, v in es]


def paper_figure2_like() -> list[tuple[int, int, float]]:
    """A handcrafted graph in the spirit of the paper's Figure 2 example:

    a 3x3 biclique {u1,u2,u3} x {v1,v2,v3} (w=3, except (u3,v1) and (u3,v2)
    at w=5), u4 attached to v1 and v2 at w=5, and a weakly attached v4.
    The significant (2,2)-community of u3 is exactly
    {(u3,v1), (u3,v2), (u4,v1), (u4,v2)} with significance 5 — mirroring the
    paper's red subgraph (Example 1).
    """
    edges = []
    for u in (1, 2, 3):
        for v in (1, 2, 3):
            w = 5.0 if (u == 3 and v in (1, 2)) else 3.0
            edges.append((u, v, w))
    edges += [(4, 1, 5.0), (4, 2, 5.0), (1, 4, 1.0), (2, 4, 1.0)]
    return edges


def eset(edges) -> set[tuple[int, int]]:
    """(u, v) pairs of a python edge list."""
    return {(u, v) for u, v, *_ in edges}


def eset_df(df) -> set[tuple[int, int]]:
    """(u, v) pairs of a Spark edge DataFrame."""
    return {(int(r["u"]), int(r["v"])) for r in df.select("u", "v").collect()}


def wset_df(df) -> set[tuple[int, int, float]]:
    """(u, v, w) triples of a Spark edge DataFrame."""
    return {
        (int(r["u"]), int(r["v"]), float(r["w"]))
        for r in df.select("u", "v", "w").collect()
    }
