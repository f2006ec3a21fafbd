"""Deterministic k-core decomposition (k-(1,2)-nucleus), bucket peeling.

Standard Batagelj–Zaveršnik: repeatedly remove a minimum-degree vertex;
its core number is the running maximum of the degree at removal time.
"""
import heapq

from repro.det.adjacency import adj_sets


def core_numbers(edges) -> dict:
    """Core number per vertex for an iterable of canonical edges."""
    adj = {v: set(n) for v, n in adj_sets(edges).items()}
    heap = [(len(n), v) for v, n in adj.items()]
    heapq.heapify(heap)
    removed: set = set()
    core: dict = {}
    level = 0
    while heap:
        d, v = heapq.heappop(heap)
        if v in removed or d != len(adj[v]):
            continue  # stale heap entry
        level = max(level, d)
        core[v] = level
        removed.add(v)
        for w in adj[v]:
            adj[w].discard(v)
            heapq.heappush(heap, (len(adj[w]), w))
        adj[v] = set()
    return core
