"""Exact possible-world enumeration + set-probability estimators."""
import numpy as np
import pytest

from repro.core.estimate import estimate_set_probs, expected_density
from repro.core.exact import exact_tau, exact_topk_mpds
from repro.core.uncertain import UncertainGraph
from repro.datasets import er_graph, fig1_graph


def test_exact_tau_fig1_table1(spark):
    """Reproduce the DSP column of Table I exactly."""
    tab = exact_tau(spark, fig1_graph(), "edge").set_index("nodeset")
    assert tab.loc["0,1", "tau"] == pytest.approx(0.072)
    assert tab.loc["0,2", "tau"] == pytest.approx(0.24)
    assert tab.loc["1,3", "tau"] == pytest.approx(0.42)
    assert tab.loc["0,1,2", "tau"] == pytest.approx(0.048)
    assert tab.loc["0,1,3", "tau"] == pytest.approx(0.168)
    assert tab.loc["0,1,2,3", "tau"] == pytest.approx(0.28)


def test_exact_eed_fig1_table1(spark):
    """Reproduce the EED row of Table I exactly."""
    tab = exact_tau(spark, fig1_graph(), "edge").set_index("nodeset")
    assert tab.loc["0,1", "eed"] == pytest.approx(0.2)
    assert tab.loc["1,3", "eed"] == pytest.approx(0.35)
    assert tab.loc["0,1,2,3", "eed"] == pytest.approx(0.375)


def test_exact_tau_sums_to_nonempty_mass(spark):
    """Σ_U τ(U) ≥ 1 − Pr(empty world) (each non-empty world has ≥ 1
    densest subgraph; ties give several)."""
    ug = fig1_graph()
    tab = exact_tau(spark, ug, "edge")
    p_empty = float(np.prod(1 - ug.probs))
    assert tab.tau.sum() >= (1 - p_empty) - 1e-9


def test_exact_topk(spark):
    top = exact_topk_mpds(spark, fig1_graph(), k=2)
    assert top[0][0] == frozenset({1, 3})
    assert top[0][1] == pytest.approx(0.42)
    assert top[1][0] == frozenset({0, 1, 2, 3})


def test_exact_rejects_large_m(spark):
    ug = er_graph(9, 30)
    with pytest.raises(ValueError):
        exact_tau(spark, ug, "edge")


def test_exact_clique_consistency_with_sampling(spark):
    """Exact τ₃ agrees with the sampling estimator on a small graph."""
    ug = er_graph(6, 10, seed=8)
    tab = exact_tau(spark, ug, "clique:3")
    best = tab.sort_values("tau", ascending=False).iloc[0]
    from repro.core.mpds import topk_mpds

    approx = topk_mpds(spark, ug, k=1, theta=3000, notion="clique:3", seed=1)
    assert approx.best_tau == pytest.approx(best.tau, abs=0.05)


def test_estimate_set_probs_fig1(spark):
    ug = fig1_graph()
    bd, abcd, ab = frozenset({1, 3}), frozenset({0, 1, 2, 3}), frozenset({0, 1})
    out = estimate_set_probs(spark, ug, [bd, abcd, ab], theta=3000, seed=2)
    assert out.tau_hat[0] == pytest.approx(0.42, abs=0.04)
    assert out.tau_hat[1] == pytest.approx(0.28, abs=0.04)
    assert out.tau_hat[2] == pytest.approx(0.072, abs=0.03)
    # containment: gamma({B,D}) = .7 (Example 3); gamma(ABCD) = tau(ABCD)
    assert out.gamma_hat[0] == pytest.approx(0.7, abs=0.04)
    assert out.gamma_hat[1] == pytest.approx(0.28, abs=0.04)


def test_estimate_empty_candidate(spark):
    out = estimate_set_probs(spark, fig1_graph(), [frozenset()], theta=100)
    assert out.tau_hat[0] == 0.0 and out.gamma_hat[0] == 0.0


def test_expected_density_edge_exact():
    ug = fig1_graph()
    assert expected_density(ug, frozenset({1, 3})) == pytest.approx(0.35)
    assert expected_density(ug, frozenset({0, 1, 2, 3})) == pytest.approx(0.375)


def test_expected_density_clique():
    # triangle with probs .5 each: E[mu3]/3 = 0.125/3
    ug = UncertainGraph.from_edges(
        [(0, 1), (1, 2), (0, 2)], [0.5] * 3, n=3
    )
    assert expected_density(ug, frozenset({0, 1, 2}), "clique:3") == (
        pytest.approx(0.125 / 3)
    )


def test_expected_density_pattern():
    # 2-star at center 1 with arms .4/.7: E = .28; /3 nodes
    ug = fig1_graph()
    got = expected_density(ug, frozenset({0, 1, 3}), "2-star")
    assert got == pytest.approx(0.4 * 0.7 / 3)
