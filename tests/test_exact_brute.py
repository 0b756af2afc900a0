"""Exact possible-world solver vs a direct Python enumeration oracle."""
from itertools import combinations

import numpy as np
import pytest

from repro.core.exact import exact_tau
from repro.core.uncertain import UncertainGraph
from repro.graphs.bruteforce import brute_all_densest


def brute_tau(ug, notion):
    """τ(U) for all subsets by enumerating 2^m worlds in plain Python."""
    m = ug.m
    tau = {}
    for wmask in range(1 << m):
        keep = [(wmask >> i) & 1 == 1 for i in range(m)]
        pr = 1.0
        for i, k in enumerate(keep):
            pr *= ug.probs[i] if k else (1 - ug.probs[i])
        world = ug.edges[np.array(keep, dtype=bool)]
        _rho, sets = brute_all_densest(world, notion)
        for s in sets:
            key = ",".join(str(v) for v in sorted(s))
            tau[key] = tau.get(key, 0.0) + pr
    return tau


def random_ug(seed, n=5, m=7):
    g = np.random.default_rng(seed)
    pairs = list(combinations(range(n), 2))
    sel = g.choice(len(pairs), size=m, replace=False)
    probs = g.uniform(0.2, 0.9, size=m)
    return UncertainGraph.from_edges([pairs[i] for i in sel], probs, n=n)


@pytest.mark.parametrize("seed", range(3))
@pytest.mark.parametrize("notion", ["edge", "clique:3", "2-star"])
def test_exact_tau_matches_python_brute(spark, seed, notion):
    ug = random_ug(seed)
    exp = brute_tau(ug, notion)
    got = exact_tau(spark, ug, notion)
    got_d = dict(zip(got.nodeset, got.tau))
    for key, val in exp.items():
        assert got_d[key] == pytest.approx(val, abs=1e-9)
    # subsets not in exp must have tau 0
    for key, val in got_d.items():
        if key not in exp:
            assert val == pytest.approx(0.0, abs=1e-12)


def test_exact_diamond_small(spark):
    ug = random_ug(9, n=5, m=8)
    exp = brute_tau(ug, "diamond")
    got = exact_tau(spark, ug, "diamond")
    got_d = dict(zip(got.nodeset, got.tau))
    for key, val in exp.items():
        assert got_d[key] == pytest.approx(val, abs=1e-9)
