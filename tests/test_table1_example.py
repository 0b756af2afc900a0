"""End-to-end reproduction of the paper's worked Example 1 / Table I.

The uncertain graph of Figure 1 has three edges (A,B) p=.4, (A,C) p=.4,
(B,D) p=.7. Table I lists, for six node sets, their edge densities in
each possible world, expected edge densities (EED), and densest
subgraph probabilities (DSP). We reproduce every number.
"""
import numpy as np
import pytest

from repro.core.exact import exact_tau
from repro.datasets import fig1_graph

A, B, C, D = 0, 1, 2, 3

TABLE1 = {  # nodeset -> (EED, DSP) as printed in the paper (2 decimals)
    (A, B): (0.2, 0.07),
    (A, C): (0.2, 0.24),
    (B, D): (0.35, 0.42),
    (A, B, C): (0.27, 0.05),
    (A, B, D): (0.37, 0.17),
    (A, B, C, D): (0.38, 0.28),
}


@pytest.fixture(scope="module")
def tab(spark):
    return exact_tau(spark, fig1_graph(), "edge").set_index("nodeset")


@pytest.mark.parametrize("nodes", list(TABLE1))
def test_eed_matches_table1(tab, nodes):
    key = ",".join(str(v) for v in nodes)
    eed, _ = TABLE1[nodes]
    assert tab.loc[key, "eed"] == pytest.approx(eed, abs=0.006)


@pytest.mark.parametrize("nodes", list(TABLE1))
def test_dsp_matches_table1(tab, nodes):
    key = ",".join(str(v) for v in nodes)
    _, dsp = TABLE1[nodes]
    assert tab.loc[key, "tau"] == pytest.approx(dsp, abs=0.006)


def test_world_probabilities_match_example1():
    """G7 = .168 and G8 = .112 as quoted in Example 1's text."""
    ug = fig1_graph()
    p = dict(zip([tuple(e) for e in ug.edges.tolist()], ug.probs))
    pab, pac, pbd = p[(A, B)], p[(A, C)], p[(B, D)]
    assert (1 - pab) * pac * pbd == pytest.approx(0.168)  # G7
    assert pab * pac * pbd == pytest.approx(0.112)  # G8


def test_mpds_is_bd_not_max_expected(tab):
    """The paper's headline: argmax DSP = {B,D} although {A,B,C,D} has
    the maximum expected density."""
    best_dsp = tab.tau.idxmax()
    best_eed = tab.eed.idxmax()
    assert best_dsp == "1,3"
    assert best_eed == "0,1,2,3"
