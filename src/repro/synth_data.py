"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# --- graph generators (uncertain-graph reproduction; DESIGN.md §4) ----------
#
# The paper under reproduction evaluates on graphs, not OLAP tables, so the
# generator module is extended with deterministic graph topologies. All
# return canonical (m, 2) int64 edge arrays with u < v, no dupes.


def _dedup(edges: list[tuple[int, int]]) -> np.ndarray:
    e = np.array(
        sorted({(min(u, v), max(u, v)) for u, v in edges if u != v}),
        dtype=np.int64,
    )
    return e.reshape(-1, 2)


def er_edges(n: int, p: float, seed: int = 0) -> np.ndarray:
    """Erdős–Rényi G(n, p) edge list."""
    g = _rng(seed)
    out = []
    for u in range(n):
        hits = np.flatnonzero(g.random(n - u - 1) < p)
        out.extend((u, u + 1 + int(h)) for h in hits)
    return _dedup(out)


def er_edges_exact_m(n: int, m: int, seed: int = 0) -> np.ndarray:
    """Erdős–Rényi G(n, m): exactly m distinct edges."""
    g = _rng(seed)
    all_pairs = [(u, v) for u in range(n) for v in range(u + 1, n)]
    sel = g.choice(len(all_pairs), size=m, replace=False)
    return _dedup([all_pairs[i] for i in sel])


def ba_edges(
    n: int, m_attach: int, seed: int = 0, extra_triads: float = 0.0
) -> np.ndarray:
    """Barabási–Albert preferential attachment.

    ``extra_triads``: probability, per new edge, of also closing a
    triangle through the chosen target — bumps clustering so that
    clique/pattern experiments have non-trivial structure.
    """
    g = _rng(seed)
    edges: list[tuple[int, int]] = []
    targets = list(range(m_attach + 1))
    for u, v in [(i, j) for i in range(m_attach + 1) for j in range(i + 1, m_attach + 1)]:
        edges.append((u, v))
    repeated: list[int] = [v for e in edges for v in e]
    adj: dict[int, list[int]] = {}
    for u, v in edges:
        adj.setdefault(u, []).append(v)
        adj.setdefault(v, []).append(u)
    for new in range(m_attach + 1, n):
        chosen: set[int] = set()
        while len(chosen) < m_attach:
            t = int(repeated[g.integers(len(repeated))])
            chosen.add(t)
        for t in chosen:
            edges.append((new, t))
            repeated.extend((new, t))
            adj.setdefault(new, []).append(t)
            adj.setdefault(t, []).append(new)
            if extra_triads > 0 and g.random() < extra_triads and adj[t]:
                w = int(adj[t][g.integers(len(adj[t]))])
                if w != new:
                    edges.append((new, w))
                    repeated.extend((new, w))
                    adj[new].append(w)
                    adj[w].append(new)
    return _dedup(edges)


def powerlaw_uncertain(
    n: int,
    m_target: int,
    seed: int,
    prob_mean: float,
    prob_sd: float,
    nucleus_size: int = 0,
    nucleus_prob: float = 0.9,
    nucleus_density: float = 0.8,
    max_deg: int | None = None,
    fringe_size: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Power-law-ish uncertain graph with an optional planted nucleus.

    * The **nucleus** (top ``nucleus_size`` node ids) is a near-clique
      (pair prob ``nucleus_density``) of ``nucleus_prob``-probability
      edges — it makes per-world maximum densest subgraphs share a
      stable core, the regime where NDS is needed (per-set DSPs ≈ 0).
    * The **fringe** (``fringe_size`` node ids just below the nucleus)
      nodes attach to ~70% of the nucleus with probabilities tuned so
      their expected degree sits *just above* the nucleus density: the
      expected-densest subgraph (EDS) includes them, but in a random
      world each falls out of the densest subgraph roughly half the
      time — reproducing the paper's near-zero EDS containment
      probabilities (Table III) against NDS ≈ 1.
    * ``max_deg`` caps the expected background degree (Chung–Lu weights
      are truncated) so hub stars don't out-rank the nucleus in the
      probabilistic core decomposition, as in the paper's biological /
      social graphs where the densest region is also the innermost core.

    Returns ``(edges, probs)``.
    """
    g = _rng(seed)
    w = (np.arange(1, n + 1) ** -0.5).astype(np.float64)
    if max_deg is not None:
        for _ in range(4):  # fixed point of cap = max_deg * Σw / 2m
            w = np.minimum(w, max_deg * w.sum() / (2.0 * m_target))
    pw = w / w.sum()
    edges: set[tuple[int, int]] = set()
    us = g.choice(n, size=int(m_target * 1.6), p=pw)
    vs = g.choice(n, size=int(m_target * 1.6), p=pw)
    for u, v in zip(us, vs):
        if u != v:
            edges.add((min(int(u), int(v)), max(int(u), int(v))))
        if len(edges) >= m_target:
            break
    var = prob_sd**2
    ab = prob_mean * (1 - prob_mean) / var - 1
    a, b = max(ab * prob_mean, 0.05), max(ab * (1 - prob_mean), 0.05)
    nucleus = list(range(n - nucleus_size, n)) if nucleus_size else []
    special: dict[tuple[int, int], float] = {}
    for i, u in enumerate(nucleus):
        for v in nucleus[i + 1 :]:
            if g.random() < nucleus_density:
                special[(min(u, v), max(u, v))] = float(
                    np.clip(nucleus_prob + g.normal(0, 0.03), 0.5, 1.0)
                )
    if fringe_size and nucleus:
        rho_nuc = nucleus_density * nucleus_prob * (nucleus_size - 1) / 2
        k_att = max(2, int(round(0.7 * nucleus_size)))
        q = min(0.95, 1.05 * rho_nuc / k_att)
        fringe = list(range(n - nucleus_size - fringe_size, n - nucleus_size))
        for f in fringe:
            targets = g.choice(nucleus, size=k_att, replace=False)
            for t in targets:
                special[(min(f, int(t)), max(f, int(t)))] = float(
                    np.clip(q + g.normal(0, 0.02), 0.05, 0.98)
                )
    edges -= set(special)
    all_edges = sorted(edges) + sorted(special)
    probs = np.clip(g.beta(a, b, size=len(all_edges)), 1e-4, 1.0)
    probs[len(edges):] = [special[e] for e in sorted(special)]
    e = np.array(all_edges, dtype=np.int64).reshape(-1, 2)
    order = np.lexsort((e[:, 1], e[:, 0]))
    return e[order], probs[order]
