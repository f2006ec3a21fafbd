"""Deterministic k-truss decomposition (k-(2,3)-nucleus), support peeling.

Truss number of an edge = max k such that the edge lies in a maximal
subgraph where every edge is contained in ≥ k triangles (the paper's
"contained in at least k triangles" convention, footnote 1).
"""
import heapq

from repro.det.adjacency import adj_sets, canon


def truss_numbers(edges) -> dict:
    """Truss number per canonical edge for an iterable of canonical edges."""
    edges = [canon(u, v) for u, v in edges]
    adj = {v: set(n) for v, n in adj_sets(edges).items()}
    support = {e: len(adj[e[0]] & adj[e[1]]) for e in edges}
    heap = [(s, e) for e, s in support.items()]
    heapq.heapify(heap)
    removed: set = set()
    truss: dict = {}
    level = 0
    while heap:
        s, e = heapq.heappop(heap)
        if e in removed or s != support[e]:
            continue
        level = max(level, s)
        truss[e] = level
        removed.add(e)
        u, v = e
        for w in adj[u] & adj[v]:  # triangles through e die
            for other in (canon(u, w), canon(v, w)):
                if other not in removed:
                    support[other] -= 1
                    heapq.heappush(heap, (support[other], other))
        adj[u].discard(v)
        adj[v].discard(u)
    return truss
