"""Distributed Top-k MPDS (Algorithm 1) — correctness on known graphs."""
import numpy as np
import pytest

from repro.core.mpds import MPDSResult, topk_mpds, world_results_df, world_stats
from repro.core.uncertain import UncertainGraph
from repro.datasets import fig1_graph, karate_club


@pytest.fixture(scope="module")
def fig1():
    return fig1_graph()


def test_fig1_top1_is_bd(spark, fig1):
    res = topk_mpds(spark, fig1, k=1, theta=1500, seed=1)
    assert res.best_set == frozenset({1, 3})  # {B, D}
    assert res.best_tau == pytest.approx(0.42, abs=0.05)


def test_fig1_topk_ordering(spark, fig1):
    res = topk_mpds(spark, fig1, k=3, theta=1500, seed=2)
    taus = [t for _, t in res.top]
    assert taus == sorted(taus, reverse=True)
    # exact values: {B,D}=.42, {A,B,C,D}=.28, {A,C}=.24
    assert [s for s, _ in res.top] == [
        frozenset({1, 3}), frozenset({0, 1, 2, 3}), frozenset({0, 2})
    ]


def test_tau_sums_reflect_world_weights(spark, fig1):
    df = world_results_df(spark, fig1, theta=200, seed=3)
    meta = df.filter(df.kind == "meta").toPandas()
    assert len(meta) == 200
    assert meta.weight.sum() == pytest.approx(200.0)


def test_empty_worlds_contribute_nothing(spark):
    ug = UncertainGraph.from_edges([(0, 1)], [0.3], n=2)
    res = topk_mpds(spark, ug, k=2, theta=1000, seed=4)
    # only one candidate set {0,1}, tau ~= 0.3
    assert len(res.top) == 1
    assert res.top[0][0] == frozenset({0, 1})
    assert res.top[0][1] == pytest.approx(0.3, abs=0.05)


def test_one_vs_all_subgraphs(spark):
    # two disjoint edges with prob 1: every world has 3 densest subgraphs;
    # all-mode credits each, one-mode credits one per world.
    ug = UncertainGraph.from_edges([(0, 1), (2, 3)], [1.0, 1.0], n=4)
    r_all = topk_mpds(spark, ug, k=5, theta=60, seed=5, all_subgraphs=True)
    assert len(r_all.top) == 3
    assert all(t == pytest.approx(1.0) for _, t in r_all.top)
    r_one = topk_mpds(spark, ug, k=5, theta=60, seed=5, all_subgraphs=False)
    assert sum(t for _, t in r_one.top) == pytest.approx(1.0)


def test_unbiasedness_against_exact(spark, fig1):
    """τ̂ is unbiased (Lemma 1): large θ concentrates on exact τ."""
    res = topk_mpds(spark, fig1, k=6, theta=4000, seed=6)
    exact = {
        frozenset({1, 3}): 0.42, frozenset({0, 1, 2, 3}): 0.28,
        frozenset({0, 2}): 0.24, frozenset({0, 1, 3}): 0.168,
        frozenset({0, 1}): 0.072, frozenset({0, 1, 2}): 0.048,
    }
    for s, t in res.top:
        assert t == pytest.approx(exact[s], abs=0.04)


def test_heuristic_mode_runs(spark):
    ug = karate_club()
    res = topk_mpds(spark, ug, k=1, theta=30, seed=7, heuristic=True)
    assert isinstance(res, MPDSResult) and res.best_set


def test_world_stats_schema(spark, fig1):
    st = world_stats(spark, fig1, theta=50, seed=8)
    assert set(st.columns) == {"world_id", "rho", "n_densest", "truncated"}
    assert len(st) == 50
    assert (st.n_densest >= 0).all()


@pytest.mark.parametrize("method", ["mc", "lp", "rss"])
def test_sampling_methods_agree(spark, fig1, method):
    res = topk_mpds(spark, fig1, k=1, theta=1500, seed=9, method=method)
    assert res.best_set == frozenset({1, 3})
    assert res.best_tau == pytest.approx(0.42, abs=0.06)


def test_karate_mpds_matches_paper_regime(spark):
    """Karate MPDS probability ≈ .012 (Table IV) and one-community purity."""
    ug = karate_club()
    res = topk_mpds(spark, ug, k=1, theta=160, seed=0)
    assert 0.004 <= res.best_tau <= 0.4
    comm = ug.meta["communities"]
    sides = {comm[v] for v in res.best_set}
    assert len(sides) == 1  # 100% purity (Table X)
