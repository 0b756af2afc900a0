"""Distributed Top-k NDS (Algorithm 5)."""
import pytest

from repro.core.nds import topk_nds
from repro.core.uncertain import UncertainGraph
from repro.datasets import fig1_graph, karate_club


def test_fig1_gamma_bd(spark):
    """γ({B,D}) = 0.7 (Example 3)."""
    res = topk_nds(spark, fig1_graph(), k=3, l_m=2, theta=2500, seed=1)
    top = dict(res.top)
    assert top[frozenset({1, 3})] == pytest.approx(0.7, abs=0.04)


def test_min_size_respected(spark):
    res = topk_nds(spark, fig1_graph(), k=5, l_m=3, theta=500, seed=2)
    assert all(len(s) >= 3 for s, _ in res.top)


def test_gamma_monotone_under_subset(spark):
    """A set's γ̂ is ≥ any superset's (containment is monotone)."""
    res = topk_nds(spark, fig1_graph(), k=10, l_m=1, theta=1000, seed=3)
    top = dict(res.top)
    for s, g in top.items():
        for s2, g2 in top.items():
            if s < s2:
                assert g >= g2 - 1e-9


def test_closedness(spark):
    """No returned set has a returned strict superset with equal γ̂."""
    res = topk_nds(spark, fig1_graph(), k=10, l_m=1, theta=1000, seed=4)
    for s, g in res.top:
        for s2, g2 in res.top:
            if s < s2:
                assert g != pytest.approx(g2, abs=1e-12) or g > g2


def test_nucleus_recovered_on_planted_graph(spark):
    """A high-prob near-clique nucleus gets γ̂ ≈ 1."""
    edges, probs = [], []
    for u in range(6):
        for v in range(u + 1, 6):
            edges.append((u, v))
            probs.append(0.95)
    edges += [(6, 7), (7, 8)]
    probs += [0.2, 0.2]
    ug = UncertainGraph.from_edges(edges, probs, n=9)
    res = topk_nds(spark, ug, k=1, l_m=4, theta=200, seed=5)
    assert res.best_set >= frozenset(range(4))
    assert res.best_gamma > 0.8


def test_heuristic_nds_close_to_approx(spark):
    """Heuristic NDS (Table XI/XII) returns a comparable nucleus."""
    ug = karate_club()
    a = topk_nds(spark, ug, k=1, l_m=3, theta=80, seed=6)
    h = topk_nds(spark, ug, k=1, l_m=3, theta=80, seed=6, heuristic=True)
    assert a.best_set and h.best_set
    jac = len(a.best_set & h.best_set) / len(a.best_set | h.best_set)
    assert jac > 0.2


def test_pattern_nds_runs(spark):
    res = topk_nds(
        spark, karate_club(), k=1, l_m=3, theta=40, notion="diamond", seed=7
    )
    assert res.best_set
