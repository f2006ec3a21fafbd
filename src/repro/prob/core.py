"""Probabilistic (k,η)-core decomposition — baseline (Bonchi et al., KDD'14).

η-degree of a vertex v: max k such that Pr[at least k of v's incident edges
exist] ≥ η. Incident edges are independent Bernoullis, so the tail is the
same Poisson-binomial machinery as the nucleus support (`repro.prob.support`).
Peeling removes a minimum-η-degree vertex with running-max level; the level
at removal is the vertex's (k,η)-core number.
"""
import heapq

import numpy as np
import pandas as pd

from repro.graph.connectivity import components_of
from repro.nucleus.local import NucleusSubgraph
from repro.prob.support import kappa_from_tail, pb_tail


def _eta_degree(ps: list[float], eta: float) -> int:
    """max k with Pr[≥ k incident edges] ≥ η (0 when no edge qualifies)."""
    if not ps:
        return 0
    return max(0, kappa_from_tail(1.0, pb_tail(np.asarray(ps)), eta))


def eta_core_numbers(edges: pd.DataFrame, eta: float) -> dict:
    """(k,η)-core number per vertex; ``edges`` has columns u, v, p."""
    inc: dict = {}
    for u, v, p in edges[["u", "v", "p"]].itertuples(index=False):
        inc.setdefault(u, {})[(u, v)] = p
        inc.setdefault(v, {})[(u, v)] = p
    deg = {x: _eta_degree(list(d.values()), eta) for x, d in inc.items()}
    heap = [(k, x) for x, k in deg.items()]
    heapq.heapify(heap)
    removed: set = set()
    core: dict = {}
    level = 0
    while heap:
        k, x = heapq.heappop(heap)
        if x in removed or k != deg[x]:
            continue
        level = max(level, k)
        core[x] = level
        removed.add(x)
        for e in list(inc[x]):
            u, v = e
            y = v if u == x else u
            if y not in removed:
                inc[y].pop(e, None)
                deg[y] = _eta_degree(list(inc[y].values()), eta)
                heapq.heappush(heap, (deg[y], y))
        inc[x] = {}
    return core


def max_eta_cores(edges: pd.DataFrame, eta: float) -> tuple[int, list[NucleusSubgraph]]:
    """(k_Cmax, connected components of the maximum (k,η)-core subgraph)."""
    core = eta_core_numbers(edges, eta)
    if not core:
        return 0, []
    k_max = max(core.values())
    keep = {v for v, k in core.items() if k >= k_max}
    sub = edges[edges.u.isin(keep) & edges.v.isin(keep)]
    comps = components_of([(u, v) for u, v in sub[["u", "v"]].itertuples(index=False)])
    out = []
    for comp in comps:
        mask = sub.u.isin(comp) & sub.v.isin(comp)
        e = {(u, v): p for u, v, p in sub[mask][["u", "v", "p"]].itertuples(index=False)}
        out.append(NucleusSubgraph(k_max, set(comp), e, set()))
    return k_max, out
