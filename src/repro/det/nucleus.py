"""Deterministic (3,4)-nucleus decomposition (Sarıyüce et al.) and the
k-nucleus membership predicates used by the FG/WG Monte-Carlo indicators.

``nucleus_numbers`` peels triangles by 4-clique support with a running-max
level: ν(△) = max k such that △ belongs to a k-(3,4)-nucleus. Connectivity
only partitions a fixed support level into maximal nuclei, it never lowers
support, so ν(△) ≥ k ⟺ △ lies in some deterministic k-nucleus — exactly the
weakly-global indicator 1_w (Definition 4).

``is_k_nucleus`` checks the *whole graph* against Definition 3 (union of
4-cliques, every triangle with support ≥ k, all triangles s-connected) — the
global indicator 1_g.
"""
import heapq

from repro.det.adjacency import (
    adj_sets,
    canon,
    clique_triangles,
    enumerate_4cliques,
    enumerate_triangles,
)
from repro.graph.connectivity import union_find


def _structures(edges):
    adj = adj_sets(edges)
    cliques = enumerate_4cliques(adj)
    tri_cliques: dict = {}
    for idx, cl in enumerate(cliques):
        for t in clique_triangles(cl):
            tri_cliques.setdefault(t, set()).add(idx)
    return cliques, tri_cliques


def nucleus_numbers(edges) -> dict:
    """ν(△) per triangle (sorted vertex triple) for canonical edges.

    Triangles contained in no 4-clique get ν = 0 (they are in no union-of-
    4-cliques subgraph, hence in no nucleus of any k ≥ 1).
    """
    edges = [canon(u, v) for u, v in edges]
    cliques, tri_cliques = _structures(edges)
    nu0 = {t: 0 for t in enumerate_triangles(adj_sets(edges)) if t not in tri_cliques}
    support = {t: len(cs) for t, cs in tri_cliques.items()}
    clique_alive = [True] * len(cliques)
    heap = [(s, t) for t, s in support.items()]
    heapq.heapify(heap)
    removed: set = set()
    nu: dict = {}
    level = 0
    while heap:
        s, t = heapq.heappop(heap)
        if t in removed or s != support[t]:
            continue
        level = max(level, s)
        nu[t] = level
        removed.add(t)
        for ci in list(tri_cliques[t]):
            if not clique_alive[ci]:
                continue
            clique_alive[ci] = False
            for t2 in clique_triangles(cliques[ci]):
                if t2 != t and t2 not in removed:
                    support[t2] -= 1
                    tri_cliques[t2].discard(ci)
                    heapq.heappush(heap, (support[t2], t2))
    nu.update(nu0)
    return nu


def is_k_nucleus(edges, k: int) -> bool:
    """Definition 3 check for the whole graph: is G a deterministic
    k-(3,4)-nucleus? (union of 4-cliques, min triangle support ≥ k,
    triangles all s-connected). Empty graphs are not nuclei."""
    edges = [canon(u, v) for u, v in edges]
    if not edges:
        return False
    cliques, tri_cliques = _structures(edges)
    if not cliques:
        return False
    covered = {canon(a, b) for cl in cliques for a in cl for b in cl if a < b}
    if any(e not in covered for e in edges):
        return False  # some edge is in no 4-clique
    if any(len(cs) < k for cs in tri_cliques.values()):
        return False
    labels = union_find([clique_triangles(cl) for cl in cliques])
    return len(set(labels.values())) == 1


def triangle_in_k_nucleus(edges, tri: tuple, k: int) -> bool:
    """1_w indicator: does some k-nucleus subgraph of G contain ``tri``?"""
    nu = nucleus_numbers(edges)
    return nu.get(tuple(sorted(tri)), -1) >= k
