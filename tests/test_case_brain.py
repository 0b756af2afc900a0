"""§VI-F brain case study: MPDS discriminates ASD from TD, EDS does not."""
import pytest

from repro.baselines import expected_densest
from repro.core.mpds import topk_mpds
from repro.datasets import brain_networks
from repro.datasets.brain import region_of


@pytest.fixture(scope="module")
def mpds_sets(spark):
    td, asd = brain_networks()
    m_td = topk_mpds(spark, td, k=1, theta=120, notion="clique:3", seed=0)
    m_asd = topk_mpds(spark, asd, k=1, theta=120, notion="clique:3", seed=0)
    return td, asd, m_td.best_set, m_asd.best_set


def test_asd_mpds_entirely_occipital(mpds_sets):
    _, _, _, s_asd = mpds_sets
    assert s_asd
    assert {region_of(v) for v in s_asd} == {"occipital"}


def test_td_mpds_spans_regions(mpds_sets):
    _, _, s_td, _ = mpds_sets
    regions = {region_of(v) for v in s_td}
    assert "occipital" in regions
    assert len(regions) >= 2  # reaches temporal and/or cerebellum


def test_asd_mpds_more_symmetric(mpds_sets):
    """ASD brains are more hemisphere-symmetric (fewer unpaired ROIs)."""
    _, _, s_td, s_asd = mpds_sets

    def unpaired(s):
        return sum(1 for v in s if (v ^ 1) not in s)

    assert unpaired(s_asd) <= unpaired(s_td)


def test_eds_fails_to_discriminate(mpds_sets):
    """The 3-clique EDSs of TD and ASD both sprawl across regions."""
    td, asd, _, _ = mpds_sets
    e_td, _ = expected_densest(td, "clique:3")
    e_asd, _ = expected_densest(asd, "clique:3")
    r_td = {region_of(v) for v in e_td}
    r_asd = {region_of(v) for v in e_asd}
    assert len(r_td) >= 2 and len(r_asd) >= 2  # neither is region-local
