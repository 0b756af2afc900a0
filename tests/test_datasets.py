"""Dataset generators: sizes, probability ranges, determinism, metadata."""
import numpy as np
import pytest

from repro.datasets import (
    ba_graph,
    biomine_lite,
    brain_networks,
    er_graph,
    fig1_graph,
    friendster_lite,
    hs_lite,
    intel_lab,
    karate_club,
    lastfm,
    twitter_lite,
)
from repro.datasets.brain import N_ROI, region_of


def test_karate_size_and_stats():
    ug = karate_club()
    assert ug.n == 34 and ug.m == 78
    # heterogeneous communication model (see karate.py docstring): mean
    # lands slightly above the paper's homogeneous .25
    assert 0.2 < ug.probs.mean() < 0.45
    assert set(ug.meta["communities"].values()) == {0, 1}
    assert len(ug.meta["communities"]) == 34


def test_karate_deterministic():
    a, b = karate_club(), karate_club()
    assert np.array_equal(a.probs, b.probs)


def test_karate_degrees():
    ug = karate_club()
    deg = np.zeros(34, int)
    np.add.at(deg, ug.edges[:, 0], 1)
    np.add.at(deg, ug.edges[:, 1], 1)
    # the two leaders are the highest-degree nodes in Zachary's club
    assert deg[33] == 17 and deg[0] == 16


def test_intel_size():
    ug = intel_lab()
    assert ug.n == 54 and ug.m == 969
    assert 0.25 < ug.probs.mean() < 0.4  # paper: 0.33


def test_lastfm_size():
    ug = lastfm()
    assert ug.n == 6_899
    assert 20_000 < ug.m < 28_000  # paper: 23 696


@pytest.mark.parametrize(
    "maker,n", [(hs_lite, 4000), (biomine_lite, 10000), (twitter_lite, 20000),
                (friendster_lite, 30000)]
)
def test_lite_datasets_have_nucleus(maker, n):
    ug = maker()
    assert ug.n == n
    nuc = ug.meta["nucleus"]
    assert len(nuc) >= 10
    # nucleus edges exist and are high-probability relative to background
    nuc_set = set(nuc)
    in_nuc = np.array(
        [int(u) in nuc_set and int(v) in nuc_set for u, v in ug.edges]
    )
    assert in_nuc.sum() > len(nuc)  # denser than a tree
    assert ug.probs[in_nuc].mean() > 2 * ug.probs[~in_nuc].mean()


def test_fig1_graph_exact_world_probs():
    ug = fig1_graph()
    assert ug.m == 3
    # Pr(G8) = .4*.4*.7 = .112 and Pr(G1) = .6*.6*.3 = .108 (Example 1)
    assert float(np.prod(ug.probs)) == pytest.approx(0.112)
    assert float(np.prod(1 - ug.probs)) == pytest.approx(0.108)


def test_er_ba_graphs():
    g1 = er_graph(7, 20)
    assert g1.n == 7 and g1.m == 20
    g2 = ba_graph(9, 3)
    assert g2.n == 9 and 15 <= g2.m <= 24
    assert ((g1.probs > 0) & (g1.probs <= 1)).all()


def test_brain_networks_structure():
    td, asd = brain_networks()
    assert td.n == asd.n == N_ROI
    # ASD cluster entirely occipital; TD spans three regions
    asd_regions = {region_of(v) for v in asd.meta["cluster"]}
    td_regions = {region_of(v) for v in td.meta["cluster"]}
    assert asd_regions == {"occipital"}
    assert td_regions == {"occipital", "temporal", "cerebellum"}


def test_brain_asd_more_symmetric():
    td, asd = brain_networks()

    def unpaired(cluster):
        s = set(cluster)
        return sum(1 for v in s if (v ^ 1) not in s)

    assert unpaired(asd.meta["cluster"]) == 1
    assert unpaired(td.meta["cluster"]) == 3
