"""ℓ-NuDecomp — local probabilistic nucleus decomposition (Algorithm 1).

Pipeline:

1. **Enumeration (Spark, distributed)** — triangles, 4-cliques and the
   triangle↔clique incidence with extension probabilities Pr(E_i)
   (`repro.graph`). This is the memory- and shuffle-heavy part.
2. **Initial κ scoring** — for every triangle, κ = max k with
   Pr(△)·Pr[ζ ≥ k] ≥ θ, using either the exact Poisson-binomial DP
   (scorer="dp") or the paper's statistical approximations with DP fallback
   (scorer="ap"). In the Spark engine this runs as a `mapInPandas` kernel
   over grouped extension lists; the driver engine scores from collected
   incidence (identical kernels).
3. **Peeling** — level-synchronous batch peeling (the distributed analog of
   Algorithm 1's min-peel; Batagelj–Zaveršnik running-max level semantics):
   at each level remove every triangle whose current κ ≤ level (cascading to
   a fixpoint), kill the 4-cliques containing them, rescore the survivors
   whose clique multiset shrank. ν(△) = removal level. Engines:
   ``engine="driver"`` (dict/heap state, rescoring only affected triangles —
   the default; extracted state is small once enumeration is done) and
   ``engine="spark"`` (all state in DataFrames, full rescoring per round,
   lineage truncated with localCheckpoint). Both produce identical ν.

Triangles with Pr(△) < θ get ν = −1: no subgraph containing them can satisfy
Definition 5 even at k = 0, so they join no nucleus and their cliques are
dead from the start.
"""
import time
from collections import Counter
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.det.adjacency import canon
from repro.graph.cliques import four_cliques, incidence
from repro.graph.connectivity import components_of
from repro.graph.triangles import triangles
from repro.prob.approx import kappa_ap
from repro.prob.support import EPS, kappa_dp


def make_scorer(scorer: str):
    """(p_tri, qs, theta) -> (κ, method-name) kernel for "dp" or "ap"."""
    if scorer == "dp":
        return lambda p_tri, qs, theta: (kappa_dp(p_tri, np.asarray(qs), theta), "dp")
    if scorer == "ap":
        return lambda p_tri, qs, theta: kappa_ap(p_tri, np.asarray(qs), theta)
    raise ValueError(f"unknown scorer {scorer!r}")


@dataclass
class LocalDecomposition:
    """Result of ℓ-NuDecomp: ν per triangle plus the structures needed to
    extract ℓ-(k,θ)-nuclei and to seed the FG/WG algorithms."""

    theta: float
    nu: dict[str, int]
    kappa0: dict[str, int]
    tri_pdf: pd.DataFrame  # tid, x, y, z, p_tri
    clique_pdf: pd.DataFrame  # cid, x, y, z, w, 6 edge probs
    methods: Counter = field(default_factory=Counter)

    @property
    def k_max(self) -> int:
        return max(self.nu.values(), default=-1)


@dataclass
class NucleusSubgraph:
    """One extracted μ-(k,θ)-nucleus: vertices, probabilistic edges, tids."""

    k: int
    vertices: set
    edges: dict  # canonical (u, v) -> p
    tids: set

    @property
    def edge_pdf(self) -> pd.DataFrame:
        rows = [(u, v, p) for (u, v), p in sorted(self.edges.items())]
        return pd.DataFrame(rows, columns=["u", "v", "p"])


def enumerate_structures(edge_df: DataFrame):
    """Spark triangle / 4-clique / incidence DataFrames for an edge DF."""
    t = triangles(edge_df)
    c = four_cliques(edge_df, t)
    return t, c, incidence(c)


def collect_structures(spark: SparkSession, edge_df: DataFrame):
    """Run the distributed enumeration once and collect the pandas frames
    (tri_pdf, clique_pdf, inc_pdf) — reusable across θ/scorer sweeps via
    ``local_decomposition(..., structures=...)`` so parameter sweeps time
    only scoring + peeling, not a re-enumeration of the same graph."""
    tri_df, clique_df, inc_df = enumerate_structures(edge_df)
    return (
        tri_df.select("tid", "x", "y", "z", "p_tri").toPandas(),
        clique_df.toPandas(),
        inc_df.toPandas(),
    )


_CLIQUE_EDGE_COLS = [
    ("x", "y", "p_xy"),
    ("x", "z", "p_xz"),
    ("y", "z", "p_yz"),
    ("x", "w", "p_xw"),
    ("y", "w", "p_yw"),
    ("z", "w", "p_zw"),
]


def _clique_tids(row) -> list[str]:
    """The four canonical (id-sorted) triangle keys of a clique row."""
    x, y, z, w = row.x, row.y, row.z, row.w
    return [
        "-".join(map(str, sorted(t)))
        for t in ((x, y, z), (x, y, w), (x, z, w), (y, z, w))
    ]


def local_decomposition(
    spark: SparkSession,
    edge_df: DataFrame,
    theta: float,
    *,
    scorer: str = "dp",
    engine: str = "driver",
    budget_s: float | None = None,
    structures=None,
) -> LocalDecomposition:
    """Full ℓ-NuDecomp of a probabilistic edge DataFrame (u, v, p).

    ``budget_s`` is an optional wall-clock budget: when exceeded the driver
    engine raises TimeoutError — the mechanism behind the paper's "N.P."
    (not possible) entries for exact DP on its largest dataset.
    ``structures`` (from :func:`collect_structures`) skips re-enumeration;
    driver engine only.
    """
    deadline = None if budget_s is None else time.monotonic() + budget_s
    if structures is not None:
        if engine != "driver":
            raise ValueError("precomputed structures require engine='driver'")
        tri_pdf, clique_pdf, inc_pdf = structures
        nu, kappa0, methods = _peel_driver(tri_pdf, inc_pdf, theta, scorer, deadline)
        return LocalDecomposition(theta, nu, kappa0, tri_pdf, clique_pdf, methods)
    tri_df, clique_df, inc_df = enumerate_structures(edge_df)
    tri_pdf = tri_df.select("tid", "x", "y", "z", "p_tri").toPandas()
    clique_pdf = clique_df.toPandas()
    if engine == "driver":
        inc_pdf = inc_df.toPandas()
        nu, kappa0, methods = _peel_driver(tri_pdf, inc_pdf, theta, scorer, deadline)
    elif engine == "spark":
        nu, kappa0, methods = _peel_spark(spark, tri_df, inc_df, theta, scorer)
    else:
        raise ValueError(f"unknown engine {engine!r}")
    return LocalDecomposition(theta, nu, kappa0, tri_pdf, clique_pdf, methods)


# ---------------------------------------------------------------------------
# driver engine
# ---------------------------------------------------------------------------


def _peel_driver(tri_pdf, inc_pdf, theta, scorer, deadline: float | None = None):
    score = make_scorer(scorer)
    methods: Counter = Counter()
    p_tri = dict(zip(tri_pdf.tid, tri_pdf.p_tri))
    alive = {t for t, p in p_tri.items() if p >= theta - EPS}
    nu = {t: -1 for t in p_tri if t not in alive}

    def check_deadline():
        if deadline is not None and time.monotonic() > deadline:
            raise TimeoutError("local decomposition exceeded its wall-clock budget")

    clique_tris: dict[str, list[str]] = {}
    for cid, tid, _ in inc_pdf.itertuples(index=False):
        clique_tris.setdefault(cid, []).append(tid)
    # a clique is alive only while all four triangles are alive
    clique_alive = {
        cid: all(t in alive for t in tids) for cid, tids in clique_tris.items()
    }
    tri_exts: dict[str, dict[str, float]] = {t: {} for t in alive}
    for cid, tid, ext in inc_pdf.itertuples(index=False):
        if clique_alive[cid]:
            tri_exts[tid][cid] = ext
    tri_cliques: dict[str, list[str]] = {t: list(d) for t, d in tri_exts.items()}

    def rescore(t):
        k, m = score(p_tri[t], list(tri_exts[t].values()), theta)
        methods[m] += 1
        return k

    kappa = {}
    for i, t in enumerate(alive):
        if i % 4096 == 0:
            check_deadline()
        kappa[t] = rescore(t)
    kappa0 = dict(kappa)
    kappa0.update({t: -1 for t in nu})  # θ-filtered triangles: κ₀ = −1
    level = 0
    while alive:
        check_deadline()
        m = min(kappa[t] for t in alive)
        level = max(level, m)
        frontier = {t for t in alive if kappa[t] <= level}
        while frontier:
            check_deadline()
            affected: set = set()
            for t in frontier:
                nu[t] = level
                alive.discard(t)
            for t in frontier:
                for cid in tri_cliques[t]:
                    if not clique_alive[cid]:
                        continue
                    clique_alive[cid] = False
                    for t2 in clique_tris[cid]:
                        if t2 in alive:
                            tri_exts[t2].pop(cid, None)
                            affected.add(t2)
            affected &= alive
            for t in affected:
                kappa[t] = rescore(t)
            frontier = {t for t in affected if kappa[t] <= level}
    return nu, kappa0, methods


# ---------------------------------------------------------------------------
# spark engine
# ---------------------------------------------------------------------------


def _kappa_map(theta: float, scorer: str):
    """mapInPandas kernel: (tid, p_tri, exts) -> (tid, kappa)."""
    score = make_scorer(scorer)

    def fn(batches):
        for pdf in batches:
            kappas = [
                score(p, np.asarray(e if e is not None else [], dtype=np.float64), theta)[0]
                for p, e in zip(pdf.p_tri, pdf.exts)
            ]
            yield pd.DataFrame({"tid": pdf.tid, "kappa": np.asarray(kappas, np.int32)})

    return fn


def _peel_spark(spark, tri_df, inc_df, theta, scorer):
    """Level-synchronous batch peeling with all state in DataFrames."""
    inc = inc_df.localCheckpoint()
    state = (
        tri_df.select(
            "tid",
            "p_tri",
            F.when(F.col("p_tri") >= theta - EPS, F.lit(None).cast("int"))
            .otherwise(F.lit(-1))
            .alias("nu"),
        )
    ).localCheckpoint()
    kappa0: dict[str, int] = {}
    level = 0
    first = True
    while True:
        alive = state.filter(F.col("nu").isNull()).select("tid", "p_tri")
        if alive.limit(1).count() == 0:
            break
        alive_cid = (
            inc.join(alive.select("tid"), "tid")
            .groupBy("cid")
            .agg(F.count("*").alias("n_alive"))
            .filter(F.col("n_alive") == 4)
            .select("cid")
        )
        sup = (
            inc.join(alive_cid, "cid")
            .groupBy("tid")
            .agg(F.collect_list("ext_prob").alias("exts"))
        )
        scored = (
            alive.join(sup, "tid", "left")
            .mapInPandas(
                _kappa_map(theta, scorer), schema="tid string, kappa int"
            )
        ).localCheckpoint()
        if first:
            kappa0 = {r.tid: r.kappa for r in scored.collect()}
            first = False
        min_k = scored.agg(F.min("kappa")).collect()[0][0]
        level = max(level, int(min_k))
        remove = scored.filter(F.col("kappa") <= level).select(
            "tid", F.lit(level).alias("new_nu")
        )
        state = (
            state.join(remove, "tid", "left")
            .select(
                "tid",
                "p_tri",
                F.coalesce("nu", "new_nu").alias("nu"),
            )
        ).localCheckpoint()
    nu = {r.tid: int(r.nu) for r in state.collect()}
    for t in nu:
        kappa0.setdefault(t, -1)  # θ-filtered triangles never got scored
    return nu, kappa0, Counter()


# ---------------------------------------------------------------------------
# nuclei extraction
# ---------------------------------------------------------------------------


def ell_nuclei(decomp: LocalDecomposition, k: int) -> list[NucleusSubgraph]:
    """All ℓ-(k,θ)-nuclei: maximal s-connected unions of 4-cliques whose
    four triangles all have ν ≥ k (the standard level-k extraction)."""
    nu = decomp.nu
    groups, rows = [], []
    for row in decomp.clique_pdf.itertuples(index=False):
        tids = _clique_tids(row)
        if all(nu.get(t, -1) >= k for t in tids):
            groups.append(tids)
            rows.append(row)
    comps = components_of(groups)
    label_of = {}
    for i, comp in enumerate(comps):
        for t in comp:
            label_of[t] = i
    out = [NucleusSubgraph(k, set(), {}, set()) for _ in comps]
    for row, tids in zip(rows, groups):
        n = out[label_of[tids[0]]]
        n.tids.update(tids)
        n.vertices.update((row.x, row.y, row.z, row.w))
        for a, b, pc in _CLIQUE_EDGE_COLS:
            u, v = getattr(row, a), getattr(row, b)
            n.edges[canon(u, v)] = getattr(row, pc)
    return out
