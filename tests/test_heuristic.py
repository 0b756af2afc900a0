"""Core-decomposition heuristic (§III-C remark)."""
import numpy as np
import pytest

from repro.graphs.alldense import all_densest
from repro.graphs.bruteforce import brute_all_densest
from repro.graphs.graph import canonical_edges
from repro.graphs.heuristic import heuristic_dense
from repro.graphs.patterns import PATTERNS


def random_graph(seed, n=9, p=0.5):
    g = np.random.default_rng(seed)
    edges = [(u, v) for u in range(n) for v in range(u + 1, n) if g.random() < p]
    return canonical_edges(np.array(edges, dtype=np.int64).reshape(-1, 2))


@pytest.mark.parametrize("seed", range(6))
def test_edge_heuristic_at_least_half_optimal(seed):
    e = random_graph(seed)
    rho, _ = brute_all_densest(e, "edge")
    h = heuristic_dense(e, "edge")
    assert h.rho >= rho / 2  # Charikar guarantee


@pytest.mark.parametrize("name", list(PATTERNS))
def test_pattern_heuristic_guarantee(name):
    e = random_graph(11, n=8, p=0.7)
    rho, _ = brute_all_densest(e, name)
    h = heuristic_dense(e, name)
    assert h.rho >= rho / PATTERNS[name].n_nodes  # 1/|V_psi| guarantee


def test_heuristic_best_density_is_achieved():
    e = random_graph(3)
    h = heuristic_dense(e, "edge")
    cnt = sum(1 for u, v in e if int(u) in h.best and int(v) in h.best)
    from fractions import Fraction

    assert Fraction(cnt, len(h.best)) == h.rho


def test_heuristic_empty_graph():
    h = heuristic_dense(np.empty((0, 2), dtype=np.int64), "edge")
    assert h.rho == 0 and h.best == frozenset()


def test_heuristic_no_instances():
    h = heuristic_dense(np.array([[0, 1], [1, 2]]), "clique:3")
    assert h.rho == 0 and h.best == frozenset()


def test_heuristic_often_finds_exact_on_clean_structure():
    # a clear K5 against sparse noise: the innermost core IS the optimum
    e = [(u, v) for u in range(5) for v in range(u + 1, 5)]
    e += [(5, 6), (6, 7), (7, 8)]
    e = canonical_edges(np.array(e))
    h = heuristic_dense(e, "edge")
    exact = all_densest(e, "edge")
    assert h.best == exact.max_sized == frozenset(range(5))
    assert h.rho == exact.rho
