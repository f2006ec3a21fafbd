"""Probabilistic-graph generators and the named dataset analogs."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from helpers import TRIANGLE_SQL
from repro.datasets import ANALOGS, PAPER_TABLE1, analog_pdf
from repro.synth_data import edge_probabilities, probabilistic_graph_pdf


def rng():
    return np.random.default_rng(0)


# --- probability distributions ---------------------------------------------


@pytest.mark.parametrize("dist,mean", [("uniform", None), ("beta", 0.3), ("normal", 0.5), ("pareto", None)])
def test_probs_in_unit_interval(dist, mean):
    p = edge_probabilities(rng(), 20000, dist, mean)
    assert (p > 0).all() and (p <= 1).all()


def test_uniform_mean_half():
    assert edge_probabilities(rng(), 50000, "uniform").mean() == pytest.approx(0.5, abs=0.02)


@pytest.mark.parametrize("m", [0.13, 0.27, 0.68])
def test_beta_mean_matches(m):
    assert edge_probabilities(rng(), 50000, "beta", m).mean() == pytest.approx(m, abs=0.02)


def test_pareto_is_small_heavy_tail():
    p = edge_probabilities(rng(), 50000, "pareto")
    assert p.mean() < 0.15  # paper: pokec_Pareto probs are small
    assert np.quantile(p, 0.5) < 0.08


def test_unknown_dist_raises():
    with pytest.raises(ValueError):
        edge_probabilities(rng(), 5, "cauchy")


# --- planted-community generator -------------------------------------------


def test_generator_deterministic_in_seed():
    kw = dict(n_vertices=100, communities=[8, 8], bg_edges=50, seed=4)
    a, b = probabilistic_graph_pdf(**kw), probabilistic_graph_pdf(**kw)
    pd.testing.assert_frame_equal(a, b)
    c = probabilistic_graph_pdf(**{**kw, "seed": 5})
    assert not a.equals(c)


def test_generator_canonical_no_dupes():
    pdf = probabilistic_graph_pdf(
        n_vertices=200, communities=[10, 10], bg_edges=500, hubs=[50], seed=1
    )
    assert (pdf.u < pdf.v).all()
    assert not pdf.duplicated(["u", "v"]).any()


def test_communities_create_triangles():
    pdf = probabilistic_graph_pdf(n_vertices=60, communities=[12, 12], bg_edges=0, seed=2)
    con = duckdb.connect()
    con.register("e", pdf)
    n_tri = con.execute(f"SELECT count(*) FROM ({TRIANGLE_SQL})").fetchone()[0]
    con.close()
    # two near-complete 12-communities → close to 2·C(12,3) = 440 triangles
    assert n_tri > 250


def test_hub_raises_max_degree():
    no_hub = probabilistic_graph_pdf(n_vertices=500, bg_edges=300, seed=3)
    hub = probabilistic_graph_pdf(n_vertices=500, bg_edges=300, hubs=[200], seed=3)

    def dmax(pdf):
        return pd.concat([pdf.u, pdf.v]).value_counts().max()

    assert dmax(hub) >= dmax(no_hub) + 100


def test_intra_boost_lifts_community_probs():
    pdf = probabilistic_graph_pdf(
        n_vertices=40, communities=[20], bg_edges=0, dist="beta", dist_mean=0.1,
        intra_boost=0.5, seed=6,
    )
    assert pdf.p.min() >= 0.5


def test_oversized_communities_rejected():
    with pytest.raises(ValueError):
        probabilistic_graph_pdf(n_vertices=10, communities=[8, 8])


# --- named analogs ----------------------------------------------------------


@pytest.mark.parametrize("name", list(ANALOGS))
def test_analog_generates(name):
    pdf = analog_pdf(name, sf=0.05)
    assert len(pdf) > 50
    assert (pdf.p > 0).all() and (pdf.p <= 1).all()


@pytest.mark.parametrize("name,paper_pavg", [
    ("krogan", 0.68), ("dblp", 0.26), ("flickr", 0.13), ("pokec", 0.50),
])
def test_analog_mean_prob_tracks_paper(name, paper_pavg):
    """Background-edge p_avg follows paper Table 1 (community edges are
    boosted, so compare medians loosely)."""
    pdf = analog_pdf(name, sf=0.3)
    assert abs(pdf.p.mean() - paper_pavg) < 0.35


def test_analog_dist_override():
    pdf = analog_pdf("pokec", sf=0.05, dist="pareto")
    assert pdf.p.mean() < analog_pdf("pokec", sf=0.05).p.mean()


def test_analog_triangle_ordering_preserved():
    """Triangle counts keep the paper's dataset ordering (krogan smallest,
    enwiki largest) at matched sf."""
    con = duckdb.connect()

    def tri_count(name):
        con.register("e", analog_pdf(name, sf=0.15))
        return con.execute(f"SELECT count(*) FROM ({TRIANGLE_SQL})").fetchone()[0]

    k, p, e = tri_count("krogan"), tri_count("pokec"), tri_count("enwiki")
    con.close()
    assert k < p < e


def test_paper_table1_registry_complete():
    assert set(PAPER_TABLE1) == set(ANALOGS)
