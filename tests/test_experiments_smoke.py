"""Smoke-test every table harness at reduced θ (full runs: jobs/ + benchmarks/)."""
import pytest

from repro.experiments import tables as T


@pytest.mark.slow
def test_table3_smoke(spark):
    df = T.table3_nds_compare(spark, datasets=("hs_lite",), theta=24)
    row = df.iloc[0]
    assert row.cont_nds >= row.cont_eds - 1e-9
    assert 0 <= row.cont_nds <= 1


@pytest.mark.slow
def test_table4_smoke(spark):
    df = T.table4_mpds_compare(spark, datasets=("karate",), theta=40)
    row = df.iloc[0]
    assert row.dsp_mpds >= row.dsp_eds
    assert row.ed_eds > 0


@pytest.mark.slow
def test_table5_smoke(spark):
    df = T.table5_probabilistic_density(spark, datasets=("karate",), theta=40)
    row = df.iloc[0]
    # MPDS is at least as cohesive as EDS (on karate the strong core can
    # make the two sets coincide at small θ — allow a small tolerance)
    assert row.pd_ours >= row.pd_eds - 0.1
    assert row.pd_ours > row.pd_truss - 0.15


@pytest.mark.slow
def test_table6_smoke(spark):
    df = T.table6_probabilistic_clustering(
        spark, datasets=("karate",), theta=40
    )
    assert (df.iloc[0][["pcc_ours", "pcc_eds", "pcc_core", "pcc_truss"]] >= 0).all()


@pytest.mark.slow
def test_table7_smoke(spark):
    df = T.table7_mpds_vs_dds(spark, datasets=("karate",), theta=40)
    row = df.iloc[0]
    assert row.dsp_mpds >= row.dsp_dds  # MPDS beats DDS (Table VII)


@pytest.mark.slow
def test_table8_smoke(spark):
    df = T.table8_n_densest_distribution(
        spark, datasets=("karate",), notions=("edge",), theta=30
    )
    row = df.iloc[0]
    assert row["mean"] >= 1.0  # every non-empty world has >= 1 densest


@pytest.mark.slow
def test_table9_smoke(spark):
    df = T.table9_all_vs_one(
        spark, datasets=("karate",), notions=("edge",), theta=40
    )
    row = df.iloc[0]
    assert row["all"] >= row["one"] - 1e-9  # considering all never hurts


@pytest.mark.slow
def test_table10_smoke(spark):
    df = T.table10_purity(spark, ks=(1, 2), theta=40)
    assert df.iloc[0].mpds == 1.0  # MPDS purity 1 (Table X)


@pytest.mark.slow
def test_table11_smoke(spark):
    df = T.table11_pattern_nds(spark, patterns=("diamond",), theta=24)
    row = df.iloc[0]
    assert row.gamma_approx >= row.gamma_heur - 0.15
    assert row.secs_heur <= row.secs_approx * 2.0


@pytest.mark.slow
def test_table12_smoke(spark):
    df = T.table12_friendster_nds(spark, theta=16)
    gam = dict(zip(df.method, df.gamma))
    assert gam["approx"] >= gam["heuristic"] - 0.15


@pytest.mark.slow
def test_table13_smoke(spark):
    df = T.table13_sampling_mpds(spark)
    assert set(df.method) == {"mc", "lp", "rss"}
    st = dict(zip(df.method, df.state_bytes))
    assert st["mc"] < st["lp"] and st["mc"] < st["rss"]


@pytest.mark.slow
def test_table15_smoke(spark):
    df = T.table15_exact_vs_approx(
        spark, graphs=("BA_7",), notions=("edge",), theta=300
    )
    row = df.iloc[0]
    assert row.f1_top1 == 1.0  # k=1 always exact (paper §VI-H)
