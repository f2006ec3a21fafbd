"""Probabilistic local (k,γ)-truss decomposition — baseline (Huang, Lu,
Lakshmanan, SIGMOD'16).

Edge support: for e = (u,v) with common neighbours w_1..w_c, the triangles
(u,v,w_i) exist independently given e (the side-edge pairs are disjoint), so
support is Poisson-binomial over q_i = p(u,w_i)·p(v,w_i) and

    κ_T(e) = max { k : p_e · Pr[ζ_e ≥ k] ≥ γ },   −1 if p_e < γ.

Peeling removes a minimum-κ_T edge with running-max level (same generalized-
core semantics as the nucleus peeler, one level down in the (r,s) hierarchy).
We use the paper's "contained in ≥ k triangles" convention (footnote 1);
Huang et al.'s (k−2) convention is the same numbers shifted by 2.
"""
import heapq

import numpy as np
import pandas as pd

from repro.det.adjacency import canon
from repro.graph.connectivity import components_of
from repro.nucleus.local import NucleusSubgraph
from repro.prob.support import EPS, kappa_dp


def gamma_truss_numbers(edges: pd.DataFrame, gamma: float) -> dict:
    """(k,γ)-truss number per canonical edge; ``edges`` has columns u, v, p.

    Edges with p_e < γ get −1 (they survive at no level).
    """
    p_edge = {
        canon(u, v): p for u, v, p in edges[["u", "v", "p"]].itertuples(index=False)
    }
    adj: dict = {}
    for (u, v) in p_edge:
        adj.setdefault(u, set()).add(v)
        adj.setdefault(v, set()).add(u)
    # per-edge dict: common neighbour w -> q = p(u,w)·p(v,w)
    side: dict = {}
    for (u, v), p in p_edge.items():
        side[(u, v)] = {
            w: p_edge[canon(u, w)] * p_edge[canon(v, w)] for w in adj[u] & adj[v]
        }

    def kap(e):
        if p_edge[e] < gamma - EPS:
            return -1
        return kappa_dp(p_edge[e], np.array(list(side[e].values())), gamma)

    kappa = {e: kap(e) for e in p_edge}
    heap = [(k, e) for e, k in kappa.items()]
    heapq.heapify(heap)
    removed: set = set()
    truss: dict = {}
    level = 0
    while heap:
        k, e = heapq.heappop(heap)
        if e in removed or k != kappa[e]:
            continue
        removed.add(e)
        if k < 0:
            truss[e] = -1
        else:
            level = max(level, k)
            truss[e] = level
        u, v = e
        adj[u].discard(v)
        adj[v].discard(u)
        # every triangle (u,v,w) dies: edge (u,w) loses common neighbour v,
        # edge (v,w) loses common neighbour u
        for w in list(side[e]):
            for other, gone in ((canon(u, w), v), (canon(v, w), u)):
                if other not in removed:
                    side[other].pop(gone, None)
                    kappa[other] = kap(other)
                    heapq.heappush(heap, (kappa[other], other))
    return truss


def max_gamma_trusses(
    edges: pd.DataFrame, gamma: float
) -> tuple[int, list[NucleusSubgraph]]:
    """(k_Tmax, connected components of the maximum (k,γ)-truss subgraph)."""
    truss = gamma_truss_numbers(edges, gamma)
    if not truss:
        return 0, []
    k_max = max(truss.values())
    if k_max < 0:
        return 0, []
    keep = {e for e, k in truss.items() if k >= k_max}
    comps = components_of(list(keep))
    p_edge = {
        canon(u, v): p for u, v, p in edges[["u", "v", "p"]].itertuples(index=False)
    }
    out = []
    for comp in comps:
        e = {e_: p_edge[e_] for e_ in keep if e_[0] in comp and e_[1] in comp}
        out.append(NucleusSubgraph(k_max, set(comp), e, set()))
    return k_max, out
