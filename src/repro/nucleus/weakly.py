"""WG — weakly-global nucleus decomposition (Algorithm 3).

w-NuDecomp is NP-hard (Theorem 4.2); the paper's WG algorithm samples n
possible worlds of each ℓ-(k,θ)-nucleus H, runs a *deterministic* nucleus
decomposition on every world (substrate: `repro.det.nucleus`), and keeps the
triangles whose fraction of worlds containing them inside a deterministic
k-nucleus reaches θ. The output w-nuclei are the s-connected unions of the
surviving triangles' 4-cliques.

The per-world decompositions fan out over Spark via the shared
`mc_triangle_counts` kernel (mode "w").
"""
from pyspark.sql import SparkSession

from repro.det.adjacency import canon
from repro.graph.connectivity import components_of
from repro.nucleus.local import (
    LocalDecomposition,
    NucleusSubgraph,
    _CLIQUE_EDGE_COLS,
    _clique_tids,
    ell_nuclei,
)
from repro.nucleus.global_ import mc_triangle_counts
from repro.prob.sampler import hoeffding_samples


def w_nuclei(
    spark: SparkSession,
    decomp: LocalDecomposition,
    k: int,
    *,
    eps: float = 0.1,
    delta: float = 0.1,
    n: int | None = None,
    seed: int = 0,
) -> list[NucleusSubgraph]:
    """All w-(k,θ)-nuclei for one k (Algorithm 3)."""
    n = n if n is not None else max(200, hoeffding_samples(eps, delta))
    theta = decomp.theta
    locals_ = ell_nuclei(decomp, k)
    cand_edges = {i: h.edges for i, h in enumerate(locals_)}
    counts = mc_triangle_counts(spark, cand_edges, k, n, seed, "w")
    out: list[NucleusSubgraph] = []
    for i, h in enumerate(locals_):
        got = counts.get(i, {})
        kept = {t for t in h.tids if got.get(t, 0) / n >= theta}
        # connected union of surviving triangles' 4-cliques within H
        groups, rows = [], []
        for row in decomp.clique_pdf.itertuples(index=False):
            tids = _clique_tids(row)
            if set(tids) <= kept:
                groups.append(tids)
                rows.append(row)
        for comp in components_of(groups):
            sub = NucleusSubgraph(k, set(), {}, set())
            for row, tids in zip(rows, groups):
                if tids[0] in comp:
                    sub.tids.update(tids)
                    sub.vertices.update((row.x, row.y, row.z, row.w))
                    for a, b, pc in _CLIQUE_EDGE_COLS:
                        sub.edges[canon(getattr(row, a), getattr(row, b))] = getattr(
                            row, pc
                        )
            if sub.tids:
                out.append(sub)
    return out


def w_decomposition(
    spark: SparkSession, decomp: LocalDecomposition, **kw
) -> dict[int, list[NucleusSubgraph]]:
    """w-(k,θ)-nuclei for every k = 1..k_max (k_max from the local pass)."""
    return {k: w_nuclei(spark, decomp, k, **kw) for k in range(1, decomp.k_max + 1)}
