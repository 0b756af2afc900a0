"""Scaled-down stand-ins for the paper's large graphs (DESIGN §4).

Each keeps the regime the corresponding table needs: a heavy-tailed (but
hub-capped, see ``powerlaw_uncertain``) background where per-world
densest subgraphs differ (per-set DSP ≈ 0, motivating NDS), a planted
high-probability near-clique nucleus contained in nearly every world's
maximum densest subgraph, and a marginal fringe that the EDS absorbs but
individual worlds drop (driving the EDS containment ≈ 0 rows of Table
III). Nucleus node ids are the top ids and are in ``meta["nucleus"]``.
"""
from __future__ import annotations

from ..core.uncertain import UncertainGraph
from ..synth_data import powerlaw_uncertain


def _make(name, n, m, seed, mean, sd, nuc, nuc_p, max_deg, fringe=4) -> UncertainGraph:
    edges, probs = powerlaw_uncertain(
        n, m, seed, mean, sd,
        nucleus_size=nuc, nucleus_prob=nuc_p, max_deg=max_deg,
        fringe_size=fringe,
    )
    return UncertainGraph.from_edges(
        edges, probs, n=n,
        meta={"name": name, "nucleus": list(range(n - nuc, n))},
    )


def hs_lite(seed: int = 21) -> UncertainGraph:
    """Homo-Sapiens-lite: 4 000 nodes / ~30 k edges, probs mean .32."""
    return _make("hs_lite", 4_000, 30_000, seed, 0.32, 0.21, 18, 0.92, 30)


def biomine_lite(seed: int = 22) -> UncertainGraph:
    """Biomine-lite: 10 000 nodes / ~80 k edges, probs mean .27."""
    return _make("biomine_lite", 10_000, 80_000, seed, 0.27, 0.21, 16, 0.9, 30)


def twitter_lite(seed: int = 23) -> UncertainGraph:
    """Twitter-lite: 20 000 nodes / ~45 k edges, probs mean .14."""
    return _make("twitter_lite", 20_000, 45_000, seed, 0.14, 0.10, 14, 0.88, 40)


def friendster_lite(seed: int = 24) -> UncertainGraph:
    """Friendster-lite: 30 000 nodes / ~90 k edges, very low probs.

    The paper's Friendster probabilities average .005; with a planted
    nucleus of moderately reliable edges the approximate Edge-NDS still
    finds a stable core (Table XII) while worlds stay tiny.
    """
    return _make(
        "friendster_lite", 30_000, 90_000, seed, 0.02, 0.013, 12, 0.6, 60,
        fringe=3,
    )
