"""Possible-world sampler determinism/unbiasedness and s-connectivity."""
import numpy as np
import pandas as pd
import pytest

from helpers import complete_graph
from repro.graph.cliques import four_cliques, incidence
from repro.graph.connectivity import components_of, connected_labels, union_find
from repro.prob.sampler import hoeffding_samples, sample_worlds, world_mask


# --- sampler ----------------------------------------------------------------


def test_hoeffding_paper_values():
    assert hoeffding_samples(0.1, 0.1) == 150  # §7.5: ε=δ=0.1 → n=150
    assert hoeffding_samples(0.03, 0.05) <= 2050  # Table 5 row n=2000 regime


def test_world_mask_deterministic():
    p = np.array([0.2, 0.5, 0.9])
    a = world_mask(p, 7, seed=3)
    b = world_mask(p, 7, seed=3)
    assert (a == b).all()


def test_world_mask_varies_with_sample_and_seed():
    p = np.full(64, 0.5)
    assert not (world_mask(p, 0, 0) == world_mask(p, 1, 0)).all()
    assert not (world_mask(p, 0, 0) == world_mask(p, 0, 1)).all()


def test_edge_frequencies_match_probabilities():
    p = np.array([0.1, 0.3, 0.5, 0.7, 0.9])
    worlds = sample_worlds(p, 4000, seed=5)
    freq = worlds.mean(axis=0)
    assert np.abs(freq - p).max() < 0.03


def test_certain_and_impossible_edges():
    p = np.array([0.0, 1.0])
    worlds = sample_worlds(p, 50, seed=1)
    assert not worlds[:, 0].any()
    assert worlds[:, 1].all()


# --- union-find / components ------------------------------------------------


def test_union_find_min_representative():
    labels = union_find([[3, 1], [1, 2], [9, 8]])
    assert labels[1] == labels[2] == labels[3] == 1
    assert labels[8] == labels[9] == 8


def test_components_of_disjoint_groups():
    comps = components_of([["a", "b"], ["c"], ["b", "d"]])
    assert sorted(map(sorted, comps)) == [["a", "b", "d"], ["c"]]


def test_components_empty():
    assert components_of([]) == []


# --- spark label propagation vs python union-find ---------------------------


@pytest.mark.parametrize("blocks", [1, 2, 3])
def test_connected_labels_matches_union_find(spark, blocks):
    """N disjoint K5 blocks: spark labels and DSU agree component-for-component."""
    frames = [
        complete_graph(5, 0.9).assign(u=lambda d: d.u + 10 * i, v=lambda d: d.v + 10 * i)
        for i in range(blocks)
    ]
    pdf = pd.concat(frames, ignore_index=True)
    inc = incidence(four_cliques(spark.createDataFrame(pdf)))
    got = connected_labels(inc).toPandas()
    spark_comps = {
        frozenset(g.tid) for _, g in got.groupby("label")
    }
    rows = inc.select("cid", "tid").toPandas()
    dsu_comps = {
        frozenset(c)
        for c in components_of([list(g.tid) for _, g in rows.groupby("cid")])
    }
    assert spark_comps == dsu_comps
    assert len(spark_comps) == blocks


def test_connected_labels_chain_of_cliques(spark):
    """Two K4s sharing a triangle are one s-connected component."""
    pdf = pd.DataFrame(
        [(0, 1, 1.0), (0, 2, 1.0), (1, 2, 1.0), (0, 3, 1.0), (1, 3, 1.0), (2, 3, 1.0),
         (0, 4, 1.0), (1, 4, 1.0), (2, 4, 1.0)],
        columns=["u", "v", "p"],
    )
    inc = incidence(four_cliques(spark.createDataFrame(pdf)))
    labels = connected_labels(inc).toPandas()
    assert labels.label.nunique() == 1
