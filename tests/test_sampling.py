"""Possible-world samplers: marginal correctness and estimator weights."""
import numpy as np
import pytest

from repro.core.sampling import METHODS, sample_block


@pytest.mark.parametrize("method", METHODS)
def test_marginals_match_probabilities(method):
    g = np.random.default_rng(0)
    probs = g.uniform(0.05, 0.95, size=40)
    theta = 6000
    masks, w, _ = sample_block(probs, 0, theta, seed=3, method=method, theta=theta)
    est = (masks * w[:, None]).sum(axis=0) / theta
    assert np.abs(est - probs).max() < 0.05


@pytest.mark.parametrize("method", METHODS)
def test_weights_average_to_one(method):
    probs = np.array([0.2, 0.7, 0.95, 0.4])
    theta = 500
    _, w, _ = sample_block(probs, 0, theta, 1, method, theta)
    assert w.sum() / theta == pytest.approx(1.0, abs=0.05)


def test_mc_deterministic_in_seed():
    probs = np.array([0.3, 0.6])
    a, _, _ = sample_block(probs, 0, 10, 7, "mc")
    b, _, _ = sample_block(probs, 0, 10, 7, "mc")
    assert np.array_equal(a, b)


def test_block_split_consistency_mc():
    """Contiguous blocks must reproduce the same worlds as one big block."""
    probs = np.array([0.3, 0.6, 0.9])
    full, _, _ = sample_block(probs, 0, 20, 7, "mc")
    a, _, _ = sample_block(probs, 0, 10, 7, "mc")
    # block starting at 0 matches the prefix (same seed sequence anchor)
    assert np.array_equal(full[:10], a)


def test_prob_one_edges_always_present_lp():
    probs = np.array([1.0, 0.5])
    masks, _, _ = sample_block(probs, 0, 50, 1, "lp")
    assert masks[:, 0].all()


def test_prob_one_edges_always_present_mc():
    probs = np.array([1.0, 0.5])
    masks, _, _ = sample_block(probs, 0, 50, 1, "mc")
    assert masks[:, 0].all()


def test_rss_requires_theta():
    with pytest.raises(ValueError):
        sample_block(np.array([0.5]), 0, 10, 1, "rss")


def test_unknown_method():
    with pytest.raises(ValueError):
        sample_block(np.array([0.5]), 0, 10, 1, "bogus")


def test_state_bytes_ordering():
    """Memory column of Tables XIII/XIV: MC < LP, MC < RSS."""
    g = np.random.default_rng(1)
    probs = g.uniform(0.1, 0.9, 200)
    _, _, s_mc = sample_block(probs, 0, 64, 1, "mc")
    _, _, s_lp = sample_block(probs, 0, 64, 1, "lp")
    _, _, s_rss = sample_block(probs, 0, 64, 1, "rss", theta=640)
    assert s_mc < s_lp and s_mc < s_rss


def test_rss_high_prob_edges_stratified():
    """RSS fixes the prefix edges per stratum; weighted marginals stay right."""
    probs = np.array([0.9, 0.8, 0.1])
    theta = 4000
    masks, w, _ = sample_block(probs, 0, theta, 2, "rss", theta)
    est = (masks * w[:, None]).sum(axis=0) / theta
    assert np.abs(est - probs).max() < 0.05
