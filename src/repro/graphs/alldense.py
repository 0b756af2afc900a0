"""Enumerate ALL densest subgraphs of a deterministic graph.

Edge density follows Chang & Qiao (WWW'20): Goldberg network at α = ρ*,
residual graph under a max flow, SCC condensation, then every
*independent component set* (antichain of non-trivial SCCs intersecting
V) maps bijectively to a densest subgraph via C ∪ des(C) (Algorithm 3).
Clique density is Algorithm 2 (flow network of Algorithm 6) and pattern
density is Algorithm 4 (network of Algorithm 7) — same skeleton, Λ-nodes
added to the network.

Per-world convention (matches the paper's Table I accounting): a world
with no edge / no h-clique / no ψ-instance has maximum density 0 and
contributes NO densest subgraph.

Every result is exact; ``max_enum`` caps the (possibly exponential)
number of enumerated subgraphs — the ``truncated`` flag reports the cap
being hit. The maximum-sized densest subgraph (union of all densest
subgraphs, footnote 5 / Balalau et al.) is computed directly from the
SCCs without enumeration, so NDS never truncates.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from fractions import Fraction

import numpy as np

from .cliques import clique_degrees, list_cliques, sub_cliques
from .goldberg import (
    build_clique_network,
    build_edge_network,
    build_pattern_network,
    goldberg_search,
)
from .graph import canonical_edges, degrees, induced_edge_count, relabel
from .kcore import k_core_nodes
from .patterns import PATTERNS, enumerate_instances, group_instances
from .peeling import charikar_peel, instance_core, instance_peel
from .scc import condensation, descendants_bitsets, tarjan_scc


@dataclass
class DensestResult:
    """All densest subgraphs of one deterministic graph (original labels)."""

    rho: Fraction  # maximum density (0 ⇒ no dense structure at all)
    subgraphs: list[frozenset[int]]  # all densest node sets (maybe truncated)
    max_sized: frozenset[int]  # union of all densest subgraphs
    n_densest: int  # number enumerated (== len(subgraphs))
    truncated: bool = False
    core_nodes: int = 0  # pruned-core size (complexity reporting)
    extras: dict = field(default_factory=dict)


def _enumerate_from_residual(
    net, s: int, t: int, vid_of: dict[int, int], max_enum: int
) -> tuple[list[frozenset[int]], frozenset[int], bool]:
    """Shared tail of Algorithms 2/4 and the edge pipeline.

    ``vid_of`` maps network node id → graph node id for V-nodes.
    Returns (all densest node sets, max-sized densest, truncated).
    """
    arcs = net.residual_arcs()
    comp = tarjan_scc(net.n, arcs)
    n_comps, out = condensation(net.n, arcs, comp)
    cs, ct = comp[s], comp[t]
    # V-nodes per component; components of s and t are trivial (excluded).
    comp_nodes: list[list[int]] = [[] for _ in range(n_comps)]
    for net_id, g_id in vid_of.items():
        comp_nodes[comp[net_id]].append(g_id)
    nontrivial = [c for c in range(n_comps) if c != cs and c != ct]
    nontrivial_set = set(nontrivial)
    # Restrict the DAG to non-trivial components (Lemma 8: dropping the
    # SCCs of s and t cannot disconnect paths among the others).
    out_nt: list[set[int]] = [set() for _ in range(n_comps)]
    for c in nontrivial:
        out_nt[c] = {d for d in out[c] if d in nontrivial_set}
    des = descendants_bitsets(n_comps, out_nt)
    anc = [0] * n_comps
    for c in nontrivial:
        m = des[c]
        d = 0
        while m:
            low = m & -m
            anc[low.bit_length() - 1] |= 1 << c
            m ^= low
    # Max-sized densest subgraph: union of V-nodes over all non-trivial
    # components (every V-intersecting component is a singleton antichain).
    union_nodes = frozenset(
        v for c in nontrivial for v in comp_nodes[c]
    )
    # Candidates for antichain roots: components with V-nodes.
    cands = [c for c in nontrivial if comp_nodes[c]]
    results: list[frozenset[int]] = []
    truncated = False

    def closure_nodes(mask: int) -> frozenset[int]:
        nodes: set[int] = set()
        m = mask
        while m:
            low = m & -m
            c = low.bit_length() - 1
            nodes.update(comp_nodes[c])
            m ^= low
        return frozenset(nodes)

    # Algorithm 3, iterative (explicit stack): each step extends the
    # current antichain by one candidate and emits its closure.
    stack: list[tuple[int, list[int]]] = [(0, cands)]
    while stack:
        closure_mask, allowed = stack.pop()
        for i, c in enumerate(allowed):
            new_mask = closure_mask | (1 << c) | des[c]
            results.append(closure_nodes(new_mask))
            if len(results) >= max_enum:
                truncated = True
                stack.clear()
                break
            nxt = [
                d
                for d in allowed[i + 1 :]
                if not (des[c] >> d) & 1 and not (anc[c] >> d) & 1
            ]
            if nxt:
                stack.append((new_mask, nxt))
        if truncated:
            break
    return results, union_nodes, truncated


def all_densest_edge(
    edges: np.ndarray, max_enum: int = 100_000
) -> DensestResult:
    """All edge-densest subgraphs (Chang & Qiao pipeline, exact)."""
    e = canonical_edges(edges)
    if len(e) == 0:
        return DensestResult(Fraction(0), [], frozenset(), 0)
    ce, ids = relabel(e)
    n = len(ids)
    rho_tilde, peel_set = charikar_peel(ce, n)
    core = k_core_nodes(ce, n, int(np.ceil(rho_tilde)))
    core_set = set(int(v) for v in core)
    keep = np.array([u in core_set and v in core_set for u, v in ce])
    ce2, ids2 = relabel(ce[keep])
    n2 = len(ids2)
    if n2 == 0:  # degenerate: peel found a single edge graph etc.
        ce2, ids2, n2 = ce, ids, n
        ids2 = np.arange(n, dtype=np.int64)
    id2_set_density_edges = ce2

    def density_of(S: set[int]) -> Fraction:
        return Fraction(induced_edge_count(id2_set_density_edges, S), len(S))

    # Map peel witness into the core labelling when possible.
    old_of_new = ids2  # position → old compact id
    new_of_old = {int(o): i for i, o in enumerate(old_of_new)}
    witness = {new_of_old[v] for v in peel_set if v in new_of_old}
    if not witness or density_of(witness) < rho_tilde:
        # peel set survived pruning by construction; fall back defensively
        witness = set(range(n2))
    lo = density_of(witness)

    def builder(alpha: Fraction):
        return build_edge_network(ce2, n2, alpha)

    hi = Fraction(n2 - 1, 2) + 1 if n2 >= 2 else Fraction(1)
    rho, _ = goldberg_search(builder, n2, lo, witness, hi, density_of)
    # Exact enumeration at α = ρ*.
    net, s, t, vid, _total = builder(rho)
    net.max_flow(s, t)
    vid_of = {vid[i]: int(ids[old_of_new[i]]) for i in range(n2)}
    subs, union_nodes, truncated = _enumerate_from_residual(
        net, s, t, vid_of, max_enum
    )
    return DensestResult(rho, subs, union_nodes, len(subs), truncated, n2)


def all_densest_clique(
    edges: np.ndarray, h: int, max_enum: int = 100_000
) -> DensestResult:
    """Algorithm 2: all h-clique-densest subgraphs (exact)."""
    e = canonical_edges(edges)
    if len(e) == 0:
        return DensestResult(Fraction(0), [], frozenset(), 0)
    ce, ids = relabel(e)
    n = len(ids)
    cliques = list_cliques(ce, n, h)
    if not cliques:
        return DensestResult(Fraction(0), [], frozenset(), 0)
    rho_tilde, _peel_set, _, _, _ = instance_peel(cliques, n)
    core_set = instance_core(cliques, n, int(np.ceil(rho_tilde)))
    core_cliques = [c for c in cliques if all(v in core_set for v in c)]
    # Relabel core
    core_ids = np.array(sorted(core_set), dtype=np.int64)
    pos = {int(v): i for i, v in enumerate(core_ids)}
    n2 = len(core_ids)
    cl2 = [tuple(sorted(pos[v] for v in c)) for c in core_cliques]
    keep = np.array([u in core_set and v in core_set for u, v in ce])
    ce2 = np.array(
        [[pos[int(u)], pos[int(v)]] for u, v in ce[keep]], dtype=np.int64
    ).reshape(-1, 2)
    lambdas = sub_cliques(cl2)
    cl2_per_node: list[list[int]] = [[] for _ in range(n2)]
    for i, c in enumerate(cl2):
        for v in c:
            cl2_per_node[v].append(i)

    def density_of(S: set[int]) -> Fraction:
        cnt = sum(1 for c in cl2 if all(v in S for v in c))
        return Fraction(cnt, len(S))

    # Achieved lower bound: rerun the peel on the core (peel set maps
    # awkwardly through relabelling; recomputing is cheap and safe).
    lo, witness, _, _, _ = instance_peel(cl2, n2)
    hi = Fraction(len(cl2), 1)

    def builder(alpha: Fraction):
        return build_clique_network(ce2, n2, cl2, lambdas, alpha)

    rho, _ = goldberg_search(builder, n2, lo, witness, hi, density_of)
    net, s, t, vid, _total = builder(rho)
    net.max_flow(s, t)
    vid_of = {vid[i]: int(ids[core_ids[i]]) for i in range(n2)}
    subs, union_nodes, truncated = _enumerate_from_residual(
        net, s, t, vid_of, max_enum
    )
    return DensestResult(rho, subs, union_nodes, len(subs), truncated, n2)


def all_densest_pattern(
    edges: np.ndarray, pattern: str, max_enum: int = 100_000
) -> DensestResult:
    """Algorithm 4: all ψ-densest subgraphs (exact)."""
    psi = PATTERNS[pattern]
    e = canonical_edges(edges)
    if len(e) == 0:
        return DensestResult(Fraction(0), [], frozenset(), 0)
    ce, ids = relabel(e)
    n = len(ids)
    instances = enumerate_instances(ce, n, psi)
    if not instances:
        return DensestResult(Fraction(0), [], frozenset(), 0)
    rho_tilde, _ps, _, _, _ = instance_peel(instances, n)
    core_set = instance_core(instances, n, int(np.ceil(rho_tilde)))
    core_insts = [c for c in instances if all(v in core_set for v in c)]
    core_ids = np.array(sorted(core_set), dtype=np.int64)
    pos = {int(v): i for i, v in enumerate(core_ids)}
    n2 = len(core_ids)
    insts2 = [tuple(pos[v] for v in c) for c in core_insts]
    groups = group_instances(insts2)

    def density_of(S: set[int]) -> Fraction:
        cnt = sum(1 for c in insts2 if all(v in S for v in c))
        return Fraction(cnt, len(S))

    lo, witness, _, _, _ = instance_peel(insts2, n2)
    hi = Fraction(len(insts2), 1)

    def builder(alpha: Fraction):
        return build_pattern_network(n2, groups, psi.n_nodes, alpha)

    rho, _ = goldberg_search(builder, n2, lo, witness, hi, density_of)
    net, s, t, vid, _total = builder(rho)
    net.max_flow(s, t)
    vid_of = {vid[i]: int(ids[core_ids[i]]) for i in range(n2)}
    subs, union_nodes, truncated = _enumerate_from_residual(
        net, s, t, vid_of, max_enum
    )
    return DensestResult(rho, subs, union_nodes, len(subs), truncated, n2)


def all_densest(
    edges: np.ndarray, notion: str, max_enum: int = 100_000
) -> DensestResult:
    """Dispatch by density notion: 'edge', 'clique:h', or a pattern name."""
    if notion == "edge":
        return all_densest_edge(edges, max_enum)
    if notion.startswith("clique:"):
        return all_densest_clique(edges, int(notion.split(":")[1]), max_enum)
    return all_densest_pattern(edges, notion, max_enum)
