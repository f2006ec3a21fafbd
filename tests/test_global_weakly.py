"""FG (Algorithm 2) and WG (Algorithm 3) against the paper's worked examples
and the exact possible-world oracle."""
import pytest

from helpers import complete_graph, edges_list, example2_K5, fig1_H
from repro.bruteforce import tail_probability
from repro.nucleus.global_ import g_decomposition, g_nuclei, grow_candidates
from repro.nucleus.local import local_decomposition
from repro.nucleus.weakly import w_decomposition, w_nuclei


@pytest.fixture(scope="module")
def fig1_decomp(spark):
    return local_decomposition(spark, spark.createDataFrame(fig1_H()), 0.42)


@pytest.fixture(scope="module")
def k5_decomp(spark):
    return local_decomposition(spark, spark.createDataFrame(example2_K5()), 0.01)


# --- paper Example 1 / Figure 2 ---------------------------------------------


def test_fig1_g_nuclei_are_the_two_k4s(spark, fig1_decomp):
    g = g_nuclei(spark, fig1_decomp, 1, n=400, seed=1)
    got = sorted(tuple(sorted(x.vertices)) for x in g)
    assert got == [(1, 2, 3, 4), (1, 2, 3, 5)]


def test_fig1_H_itself_not_g_nucleus(spark):
    """Pr(X_{H,(1,3,5),g} ≥ 1) = 0.3 < 0.42 — H fails the global test."""
    assert tail_probability(edges_list(fig1_H()), (1, 3, 5), 1, "g") == pytest.approx(0.3)


def test_fig1_g_nuclei_satisfy_exact_definition(spark, fig1_decomp):
    for h in g_nuclei(spark, fig1_decomp, 1, n=400, seed=1):
        e = [(u, v, p) for (u, v), p in h.edges.items()]
        for tid in h.tids:
            tri = tuple(sorted(map(int, tid.split("-"))))
            assert tail_probability(e, tri, 1, "g") >= 0.42


def test_fig1_g_nucleus_probability_values():
    """Figure 2a/2b: the only det-1-nucleus world is the full K4:
    probabilities 0.5 and 0.6 respectively."""
    h5 = [(1, 2, 1.0), (1, 3, 1.0), (2, 3, 1.0), (1, 5, 1.0), (2, 5, 1.0), (3, 5, 0.5)]
    h4 = [(1, 2, 1.0), (1, 3, 1.0), (2, 3, 1.0), (1, 4, 1.0), (2, 4, 1.0), (3, 4, 0.6)]
    assert tail_probability(h5, (1, 2, 3), 1, "g") == pytest.approx(0.5)
    assert tail_probability(h4, (1, 2, 3), 1, "g") == pytest.approx(0.6)


def test_fig1_w_nucleus_coincides_with_local(spark, fig1_decomp):
    w = w_nuclei(spark, fig1_decomp, 1, n=400, seed=1)
    assert len(w) == 1
    assert w[0].vertices == {1, 2, 3, 4, 5}
    assert len(w[0].edges) == 9


# --- paper Example 2 --------------------------------------------------------


def test_example2_k5_not_weakly_global(spark, k5_decomp):
    """ℓ-(2,0.01)-nucleus but Pr(X_w ≥ 2) = 0.6^10 = 0.006 < θ: WG empty."""
    assert k5_decomp.k_max == 2
    assert w_nuclei(spark, k5_decomp, 2, n=500, seed=2) == []


def test_example2_k5_not_global_either(spark, k5_decomp):
    assert g_nuclei(spark, k5_decomp, 2, n=500, seed=2) == []


# --- candidate growth -------------------------------------------------------


def test_grow_candidates_fig1(fig1_decomp):
    """Each seed triangle's closure inside C_1: the two K4s and their union
    (seeds in the shared triangle pull in both cliques)."""
    cands = grow_candidates(fig1_decomp, 1)
    sizes = sorted(len(c) for c in cands)
    assert sizes and all(s in (6, 9) for s in sizes)


def test_grow_candidates_k_too_high(fig1_decomp):
    assert grow_candidates(fig1_decomp, 99) == []


# --- decomposition over all k ----------------------------------------------


def test_g_decomposition_keys(spark, fig1_decomp):
    out = g_decomposition(spark, fig1_decomp, n=200, seed=3)
    assert set(out) == {1}


def test_w_decomposition_keys(spark, k5_decomp):
    out = w_decomposition(spark, k5_decomp, n=200, seed=3)
    assert set(out) == {1, 2}
    assert out[1]  # K5 worlds routinely contain 1-nuclei
    assert out[2] == []


# --- Monte-Carlo estimator accuracy (Hoeffding) ------------------------------


def test_mc_estimate_close_to_exact(spark):
    """K5(0.6): exact Pr(X_w ≥ 1 | △) compared against the sampled estimate
    within the Hoeffding ε for n = 2000."""
    from repro.nucleus.global_ import mc_triangle_counts

    edges = {(u, v): 0.6 for u, v, _ in edges_list(complete_graph(5, 0.6))}
    n = 2000
    counts = mc_triangle_counts(spark, {0: edges}, 1, n, seed=11, mode="w")
    est = counts[0].get("0-1-2", 0) / n
    exact = tail_probability(edges_list(complete_graph(5, 0.6)), (0, 1, 2), 1, "w")
    assert abs(est - exact) < 0.05


def test_mc_counts_deterministic_in_seed(spark):
    from repro.nucleus.global_ import mc_triangle_counts

    edges = {(u, v): 0.7 for u, v, _ in edges_list(complete_graph(4, 0.7))}
    a = mc_triangle_counts(spark, {0: edges}, 1, 100, seed=5, mode="g")
    b = mc_triangle_counts(spark, {0: edges}, 1, 100, seed=5, mode="g")
    assert a == b


def test_mc_counts_empty_candidates(spark):
    from repro.nucleus.global_ import mc_triangle_counts

    assert mc_triangle_counts(spark, {}, 1, 10, seed=0, mode="g") == {}


def test_mc_counts_bad_mode(spark):
    from repro.nucleus.global_ import mc_triangle_counts

    edges = {(0, 1): 1.0, (0, 2): 1.0, (1, 2): 1.0}
    with pytest.raises(Exception):
        mc_triangle_counts(spark, {0: edges}, 1, 4, seed=0, mode="zz")


# --- containment hierarchy (paper §3 remark) --------------------------------


def test_g_contained_in_w_contained_in_l(spark, fig1_decomp):
    """Every g-nucleus ⊆ some w-nucleus ⊆ some ℓ-nucleus."""
    from repro.nucleus.local import ell_nuclei

    g = g_nuclei(spark, fig1_decomp, 1, n=400, seed=1)
    w = w_nuclei(spark, fig1_decomp, 1, n=400, seed=1)
    l = ell_nuclei(fig1_decomp, 1)
    for hg in g:
        assert any(hg.edges.keys() <= hw.edges.keys() for hw in w)
    for hw in w:
        assert any(hw.edges.keys() <= hl.edges.keys() for hl in l)
