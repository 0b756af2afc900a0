"""Dinic max-flow and Tarjan SCC kernels."""
import numpy as np
import pytest

from repro.graphs.maxflow import FlowNetwork
from repro.graphs.scc import condensation, descendants_bitsets, tarjan_scc


def test_single_edge_flow():
    net = FlowNetwork(2)
    net.add_edge(0, 1, 5)
    assert net.max_flow(0, 1) == 5


def test_two_paths():
    net = FlowNetwork(4)
    net.add_edge(0, 1, 3)
    net.add_edge(1, 3, 2)
    net.add_edge(0, 2, 2)
    net.add_edge(2, 3, 4)
    assert net.max_flow(0, 3) == 4


def test_bottleneck():
    net = FlowNetwork(3)
    net.add_edge(0, 1, 10)
    net.add_edge(1, 2, 1)
    assert net.max_flow(0, 2) == 1


def test_classic_cross_network():
    # CLRS-style network with a cross edge forcing flow rerouting
    net = FlowNetwork(6)
    net.add_edge(0, 1, 16)
    net.add_edge(0, 2, 13)
    net.add_edge(1, 3, 12)
    net.add_edge(2, 1, 4)
    net.add_edge(2, 4, 14)
    net.add_edge(3, 2, 9)
    net.add_edge(3, 5, 20)
    net.add_edge(4, 3, 7)
    net.add_edge(4, 5, 4)
    assert net.max_flow(0, 5) == 23


def test_min_cut_source_side():
    net = FlowNetwork(4)
    net.add_edge(0, 1, 1)
    net.add_edge(1, 2, 100)
    net.add_edge(2, 3, 100)
    net.max_flow(0, 3)
    assert net.min_cut_source_side(0) == {0}


def test_undirected_edge_both_directions():
    net = FlowNetwork(3)
    net.add_undirected(0, 1, 2)
    net.add_edge(1, 2, 5)
    assert net.max_flow(0, 2) == 2


def test_disconnected_zero_flow():
    net = FlowNetwork(4)
    net.add_edge(0, 1, 3)
    net.add_edge(2, 3, 3)
    assert net.max_flow(0, 3) == 0


@pytest.mark.parametrize("seed", range(8))
def test_random_flow_equals_brute_min_cut(seed):
    """Max-flow == min-cut over all 2^(n-2) s-t cuts (tiny networks)."""
    g = np.random.default_rng(seed)
    n = 6
    caps = {}
    for u in range(n):
        for v in range(n):
            if u != v and g.random() < 0.5:
                caps[(u, v)] = int(g.integers(1, 10))
    net = FlowNetwork(n)
    for (u, v), c in caps.items():
        net.add_edge(u, v, c)
    flow = net.max_flow(0, n - 1)
    mids = list(range(1, n - 1))
    best = None
    for mask in range(1 << len(mids)):
        S = {0} | {mids[i] for i in range(len(mids)) if (mask >> i) & 1}
        cut = sum(c for (u, v), c in caps.items() if u in S and v not in S)
        best = cut if best is None else min(best, cut)
    assert flow == best


def test_scc_cycle_and_tail():
    arcs = [(0, 1), (1, 2), (2, 0), (2, 3)]
    comp = tarjan_scc(4, arcs)
    assert comp[0] == comp[1] == comp[2] != comp[3]


def test_scc_two_cycles():
    arcs = [(0, 1), (1, 0), (2, 3), (3, 2), (1, 2)]
    comp = tarjan_scc(4, arcs)
    assert comp[0] == comp[1] and comp[2] == comp[3] and comp[0] != comp[2]


def test_scc_reverse_topological_ids():
    # arc from comp(a) to comp(b) implies id(a) > id(b)
    arcs = [(0, 1), (1, 2)]
    comp = tarjan_scc(3, arcs)
    assert comp[0] > comp[1] > comp[2]


def test_scc_all_singletons_dag():
    arcs = [(0, 1), (0, 2), (1, 3), (2, 3)]
    comp = tarjan_scc(4, arcs)
    assert len(set(comp)) == 4


def test_condensation_removes_self_loops():
    arcs = [(0, 1), (1, 0), (1, 2)]
    comp = tarjan_scc(3, arcs)
    n_comps, out = condensation(3, arcs, comp)
    assert n_comps == 2
    assert out[comp[0]] == {comp[2]}
    assert out[comp[2]] == set()


def test_descendants_bitsets_chain():
    arcs = [(0, 1), (1, 2)]
    comp = tarjan_scc(3, arcs)
    n_comps, out = condensation(3, arcs, comp)
    des = descendants_bitsets(n_comps, out)
    c0, c1, c2 = comp[0], comp[1], comp[2]
    assert des[c0] == (1 << c1) | (1 << c2)
    assert des[c1] == (1 << c2)
    assert des[c2] == 0


@pytest.mark.parametrize("seed", range(6))
def test_scc_matches_reachability_definition(seed):
    g = np.random.default_rng(seed)
    n = 8
    arcs = [
        (int(u), int(v))
        for u in range(n)
        for v in range(n)
        if u != v and g.random() < 0.25
    ]
    comp = tarjan_scc(n, arcs)

    def reach(src):
        seen = {src}
        stack = [src]
        adj = {}
        for u, v in arcs:
            adj.setdefault(u, []).append(v)
        while stack:
            x = stack.pop()
            for y in adj.get(x, []):
                if y not in seen:
                    seen.add(y)
                    stack.append(y)
        return seen

    r = [reach(v) for v in range(n)]
    for u in range(n):
        for v in range(n):
            same = v in r[u] and u in r[v]
            assert (comp[u] == comp[v]) == same
