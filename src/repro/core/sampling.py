"""Possible-world sampling strategies (§III-A remark 2, §VI-G).

All three strategies draw worlds with the correct product-Bernoulli
distribution; they differ in how the draws are organized, which is what
Tables XIII/XIV measure (runtime / memory at equal θ):

* ``mc``  — Monte Carlo: one uniform per edge per world.
* ``lp``  — Lazy Propagation: per edge, geometric skip counters give the
  next world index in which the edge appears; state is per-edge counters
  (extra memory, same marginals). Within a Spark partition the counter
  state is re-initialized per world block, which preserves independence.
* ``rss`` — Recursive Stratified Sampling: the sample space is
  partitioned into prefix strata over the r highest-probability edges;
  samples are allocated to strata proportionally and each sample carries
  an importance weight Pr(stratum)·(θ/θ_stratum)/θ so that weighted
  frequency estimates stay unbiased.

``sample_block`` is the executor-side entry point: given a contiguous
block of world ids it returns the boolean edge masks and per-world
weights. ``state_bytes`` reports the sampler bookkeeping footprint for
the memory column of Tables XIII/XIV.
"""
from __future__ import annotations

import numpy as np

METHODS = ("mc", "lp", "rss")


def _rng(seed: int, lo: int) -> np.random.Generator:
    return np.random.default_rng(np.random.SeedSequence([seed, lo]))


def _mc_block(
    probs: np.ndarray, lo: int, hi: int, seed: int
) -> tuple[np.ndarray, np.ndarray, int]:
    g = _rng(seed, lo)
    masks = g.random((hi - lo, len(probs))) < probs[None, :]
    return masks, np.full(hi - lo, 1.0), probs.nbytes


def _lp_block(
    probs: np.ndarray, lo: int, hi: int, seed: int
) -> tuple[np.ndarray, np.ndarray, int]:
    g = _rng(seed, lo)
    b = hi - lo
    m = len(probs)
    masks = np.zeros((b, m), dtype=bool)
    # For each edge, walk its occurrence worlds with geometric skips.
    # next_occ[j] is the lazily-advanced pointer — the per-edge counter
    # state that costs LP its extra memory. log1p(-p) = -inf for p = 1
    # makes the skip 0 (edge present every world), which is correct —
    # just silence the divide warning.
    with np.errstate(divide="ignore", invalid="ignore"):
        logq = np.log1p(-np.minimum(probs, 1.0 - 1e-300))
        next_occ = np.floor(np.log1p(-g.random(m)) / logq).astype(np.int64)
    for j in range(m):
        t = int(next_occ[j])
        lq = logq[j]
        while t < b:
            masks[t, j] = True
            t += 1 + int(np.floor(np.log1p(-g.random()) / lq))
        next_occ[j] = t
    state = probs.nbytes + next_occ.nbytes + 8 * m  # counters + visit tallies
    return masks, np.full(b, 1.0), state


def _rss_plan(probs: np.ndarray, theta: int, r: int) -> list[tuple[int, int, float]]:
    """Prefix strata over the r largest-prob edges.

    Stratum j (0 ≤ j < r): edges e_0..e_{j-1} absent, e_j present.
    Stratum r: all r edges absent. Returns (stratum_id, n_samples,
    weight_per_sample·θ) triples with Σ n_samples = θ.
    """
    idx = np.argsort(-probs)[:r]
    pr = probs[idx]
    strata_p = []
    acc = 1.0
    for j in range(len(idx)):
        strata_p.append(acc * pr[j])
        acc *= 1.0 - pr[j]
    strata_p.append(acc)
    alloc = [max(1, int(round(theta * p))) for p in strata_p]
    # trim/extend to exactly theta, preferring large strata
    while sum(alloc) > theta:
        alloc[int(np.argmax(alloc))] -= 1
    while sum(alloc) < theta:
        alloc[int(np.argmax(strata_p))] += 1
    plan = []
    for j, (nj, pj) in enumerate(zip(alloc, strata_p)):
        if nj > 0:
            plan.append((j, nj, pj * theta / nj))
    return plan


def _rss_block(
    probs: np.ndarray,
    lo: int,
    hi: int,
    seed: int,
    theta: int,
    r: int = 8,
) -> tuple[np.ndarray, np.ndarray, int]:
    r = min(r, len(probs))
    plan = _rss_plan(probs, theta, r)
    idx = np.argsort(-probs)[:r]
    # world id → (stratum, fixed edge states) via the cumulative plan
    bounds = np.cumsum([nj for _, nj, _ in plan])
    g = _rng(seed, lo)
    b = hi - lo
    masks = g.random((b, len(probs))) < probs[None, :]
    weights = np.empty(b, dtype=np.float64)
    for row, wid in enumerate(range(lo, hi)):
        si = int(np.searchsorted(bounds, wid, side="right"))
        j, _nj, w = plan[si]
        weights[row] = w
        masks[row, idx[:j]] = False  # prefix absent
        if j < len(idx):
            masks[row, idx[j]] = True  # j-th present
    state = probs.nbytes + 8 * 3 * len(plan) + idx.nbytes + 64 * r  # strata tables
    return masks, weights, state


def sample_block(
    probs: np.ndarray,
    lo: int,
    hi: int,
    seed: int,
    method: str = "mc",
    theta: int | None = None,
) -> tuple[np.ndarray, np.ndarray, int]:
    """Edge masks + importance weights + sampler-state bytes for worlds [lo, hi)."""
    if method == "mc":
        return _mc_block(probs, lo, hi, seed)
    if method == "lp":
        return _lp_block(probs, lo, hi, seed)
    if method == "rss":
        if theta is None:
            raise ValueError("rss needs total theta for stratum allocation")
        return _rss_block(probs, lo, hi, seed, theta)
    raise ValueError(f"unknown sampling method {method!r}")
