"""Section 4 hardness constructions, validated numerically at toy scale.

The theorems themselves are complexity results; what we can (and do) test is
that the *reductions' structural claims* hold: Lemma 2's world-for-world
correspondence between connectivity and 0-nucleus-with-gadget, Lemma 3's
clique characterization (exhaustively), and the Theorem 4.2 construction
(w-(k,θ)-nucleus exists iff the base graph has a (k+3)-clique).
"""
from itertools import combinations

import pytest

from repro.bruteforce import tail_probability
from repro.det.adjacency import adj_sets
from repro.det.nucleus import is_k_nucleus


def _connected(edges, vertices) -> bool:
    if not vertices:
        return False
    adj = adj_sets(edges)
    seen, stack = set(), [next(iter(vertices))]
    while stack:
        v = stack.pop()
        if v in seen:
            continue
        seen.add(v)
        stack.extend(adj.get(v, ()))
    return seen >= set(vertices)


def reliability(edges_p, vertices) -> float:
    """conn(G) of Definition 6 by world enumeration."""
    total = 0.0
    m = len(edges_p)
    for mask in range(1 << m):
        pr = 1.0
        world = []
        for i, (u, v, p) in enumerate(edges_p):
            if mask >> i & 1:
                pr *= p
                world.append((u, v))
            else:
                pr *= 1 - p
        if _connected(world, vertices):
            total += pr
    return total


def test_lemma2_gadget_equivalence():
    """Attach the probability-1 triangle gadget (u,w dummies at v): worlds of
    F that are connected-0-nuclei correspond exactly to connected worlds of
    G, so the tail probability equals the reliability."""
    G = [(0, 1, 0.7), (1, 2, 0.8), (0, 2, 0.5), (2, 3, 0.6)]
    V = {0, 1, 2, 3}
    v = 0
    F = G + [(v, 10, 1.0), (v, 11, 1.0), (10, 11, 1.0)]
    VF = V | {10, 11}
    # "0-nucleus" in Lemma 2's sense = connected world (the gadget proof's
    # convention); compute both sides of Eq. 4 by enumeration.
    m = len(F)
    lhs = 0.0
    for mask in range(1 << m):
        pr = 1.0
        world = []
        for i, (a, b, p) in enumerate(F):
            if mask >> i & 1:
                pr *= p
                world.append((a, b))
            else:
                pr *= 1 - p
        if _connected(world, VF):
            lhs += pr
    assert lhs == pytest.approx(reliability(G, V))


@pytest.mark.parametrize("k", [1, 2])
def test_lemma3_only_clique_is_k_nucleus(k):
    """Exhaustive over all graphs on k+3 vertices."""
    n = k + 3
    pairs = list(combinations(range(n), 2))
    winners = []
    for mask in range(1 << len(pairs)):
        g = [pairs[i] for i in range(len(pairs)) if mask >> i & 1]
        if is_k_nucleus(g, k):
            winners.append(frozenset(g))
    assert winners == [frozenset(pairs)]


@pytest.mark.parametrize(
    "base,has_k4",
    [
        (list(combinations(range(4), 2)) + [(3, 4), (4, 5)], True),  # K4 + tail
        ([(0, 1), (1, 2), (2, 3), (3, 0), (0, 2)], False),  # no K4
    ],
)
def test_theorem42_reduction(base, has_k4):
    """The NP-hardness construction: p(e) = 1/(2^{2m}+1),
    θ = p^{(k+3)(k+2)/2} with k=1 — a w-(1,θ)-nucleus exists iff the base
    graph contains a 4-clique. Checked via the exact w-tail of each triangle."""
    k = 1
    m = len(base)
    p = 1.0 / (2.0 ** (2 * m) + 1.0)
    theta = p ** ((k + 3) * (k + 2) / 2)
    edges = [(u, v, p) for u, v in base]
    adj = adj_sets(base)
    tris = [
        (a, b, c)
        for a, b, c in combinations(sorted(adj), 3)
        if b in adj[a] and c in adj[a] and c in adj[b]
    ]
    found = any(tail_probability(edges, t, k, "w") >= theta for t in tris)
    assert found == has_k4
