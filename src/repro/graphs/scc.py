"""Iterative Tarjan strongly-connected components + condensation DAG."""
from __future__ import annotations


def tarjan_scc(n: int, arcs: list[tuple[int, int]]) -> list[int]:
    """Return ``comp`` with ``comp[v]`` = SCC id of node ``v`` (0-based).

    Component ids are assigned in reverse topological order of the
    condensation (Tarjan property): if there is an arc from SCC a to SCC
    b (a != b), then ``comp`` id of a > id of b.
    """
    adj: list[list[int]] = [[] for _ in range(n)]
    for u, v in arcs:
        adj[u].append(v)

    index = [-1] * n
    low = [0] * n
    on_stack = [False] * n
    comp = [-1] * n
    stack: list[int] = []
    next_index = 0
    next_comp = 0

    for root in range(n):
        if index[root] != -1:
            continue
        # state: (node, iterator position)
        work = [(root, 0)]
        while work:
            v, pi = work.pop()
            if pi == 0:
                index[v] = low[v] = next_index
                next_index += 1
                stack.append(v)
                on_stack[v] = True
            recurse = False
            for i in range(pi, len(adj[v])):
                w = adj[v][i]
                if index[w] == -1:
                    work.append((v, i + 1))
                    work.append((w, 0))
                    recurse = True
                    break
                if on_stack[w]:
                    low[v] = min(low[v], index[w])
            if recurse:
                continue
            if low[v] == index[v]:
                while True:
                    w = stack.pop()
                    on_stack[w] = False
                    comp[w] = next_comp
                    if w == v:
                        break
                next_comp += 1
            if work:
                parent = work[-1][0]
                low[parent] = min(low[parent], low[v])
    return comp


def condensation(
    n: int, arcs: list[tuple[int, int]], comp: list[int]
) -> tuple[int, list[set[int]]]:
    """SCC DAG: returns ``(n_comps, out_edges)`` with self-loops removed."""
    n_comps = max(comp, default=-1) + 1
    out: list[set[int]] = [set() for _ in range(n_comps)]
    for u, v in arcs:
        cu, cv = comp[u], comp[v]
        if cu != cv:
            out[cu].add(cv)
    return n_comps, out


def descendants_bitsets(n_comps: int, out: list[set[int]]) -> list[int]:
    """``des[c]`` = bitmask of strict descendants of component ``c``.

    Uses the reverse-topological id order guaranteed by
    :func:`tarjan_scc` (arcs go from higher ids to lower ids), so a
    single ascending pass suffices.
    """
    des = [0] * n_comps
    for c in range(n_comps):  # ascending = children before parents
        mask = 0
        for d in out[c]:
            mask |= (1 << d) | des[d]
        des[c] = mask
    return des
