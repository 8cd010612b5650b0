"""Sequential butterfly counting and k-bitruss (test oracle).

A butterfly is a 2x2 biclique. The support of an edge is the number of
butterflies containing it; the k-bitruss is the maximal subgraph in which
every edge has support >= k (Zou, DASFAA'16 / Wang et al., ICDE'20).
"""
from __future__ import annotations

from collections import defaultdict

from .ref_graph import Edge


def butterfly_support(edges: list[Edge]) -> dict[tuple[int, int], int]:
    """Per-edge butterfly count, keyed by (u, v)."""
    nu: dict[int, set[int]] = defaultdict(set)  # u -> {v}
    nv: dict[int, set[int]] = defaultdict(set)  # v -> {u}
    for u, v, _ in edges:
        nu[u].add(v)
        nv[v].add(u)
    sup: dict[tuple[int, int], int] = {}
    for u, v, _ in edges:
        s = 0
        for u2 in nv[v]:
            if u2 != u:
                s += len(nu[u] & nu[u2]) - 1
        sup[(u, v)] = s
    return sup


def butterfly_count(edges: list[Edge]) -> int:
    """Total number of butterflies in the graph (each counted once)."""
    # Every butterfly contains exactly 4 edges, so sum(support) = 4 * count.
    total = sum(butterfly_support(edges).values())
    assert total % 4 == 0
    return total // 4


def k_bitruss(edges: list[Edge], k: int) -> list[Edge]:
    """Maximal subgraph where every edge lies in >= k butterflies."""
    cur = list(edges)
    while cur:
        sup = butterfly_support(cur)
        bad = {e for e in sup if sup[e] < k}
        if not bad:
            return cur
        cur = [e for e in cur if (e[0], e[1]) not in bad]
    return []
