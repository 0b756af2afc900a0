"""pytest-benchmark targets — one per evaluation table.

Each benchmark runs the corresponding harness once (pedantic mode:
these are multi-second Spark jobs, not microbenchmarks) at the θ used
for EXPERIMENTS.md, on a representative dataset subset where the full
sweep would be excessive for CI. ``jobs/run_all_tables.py`` runs the
full sweeps.
"""
import pytest

from repro.experiments import tables as T


def _once(benchmark, fn):
    return benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)


@pytest.mark.benchmark(group="table3")
def test_bench_table03_nds_compare(spark, benchmark):
    df = _once(
        benchmark,
        lambda: T.table3_nds_compare(spark, datasets=("hs_lite",), theta=64),
    )
    assert df.iloc[0].cont_nds >= df.iloc[0].cont_eds - 1e-9


@pytest.mark.benchmark(group="table4")
def test_bench_table04_mpds_compare(spark, benchmark):
    df = _once(
        benchmark,
        lambda: T.table4_mpds_compare(spark, datasets=("karate", "intel"), theta=96),
    )
    assert (df.dsp_mpds >= df.dsp_truss - 1e-9).all()


@pytest.mark.benchmark(group="table5")
def test_bench_table05_probabilistic_density(spark, benchmark):
    df = _once(
        benchmark,
        lambda: T.table5_probabilistic_density(
            spark, datasets=("karate", "hs_lite"), theta=64
        ),
    )
    assert (df.pd_ours > 0).all()


@pytest.mark.benchmark(group="table6")
def test_bench_table06_probabilistic_clustering(spark, benchmark):
    df = _once(
        benchmark,
        lambda: T.table6_probabilistic_clustering(
            spark, datasets=("karate",), theta=64
        ),
    )
    assert (df.pcc_ours >= 0).all()


@pytest.mark.benchmark(group="table7")
def test_bench_table07_mpds_vs_dds(spark, benchmark):
    df = _once(
        benchmark,
        lambda: T.table7_mpds_vs_dds(spark, datasets=("karate", "intel"), theta=96),
    )
    assert (df.dsp_mpds >= df.dsp_dds - 1e-9).all()


@pytest.mark.benchmark(group="table8")
def test_bench_table08_n_densest(spark, benchmark):
    df = _once(
        benchmark,
        lambda: T.table8_n_densest_distribution(
            spark, datasets=("karate", "lastfm"), notions=("edge",), theta=64
        ),
    )
    karate = df[df.dataset == "karate"].iloc[0]
    last = df[df.dataset == "lastfm"].iloc[0]
    assert last["mean"] > karate["mean"]  # LastFM tie explosion (Table VIII)


@pytest.mark.benchmark(group="table9")
def test_bench_table09_all_vs_one(spark, benchmark):
    df = _once(
        benchmark,
        lambda: T.table9_all_vs_one(
            spark, datasets=("lastfm",), notions=("edge",), theta=64
        ),
    )
    row = df.iloc[0]
    assert row["all"] >= row["one"]  # up-to-20x gap direction (Table IX)


@pytest.mark.benchmark(group="table10")
def test_bench_table10_purity(spark, benchmark):
    df = _once(benchmark, lambda: T.table10_purity(spark, theta=96))
    assert df.iloc[0].mpds == 1.0


@pytest.mark.benchmark(group="table11")
def test_bench_table11_pattern_nds(spark, benchmark):
    df = _once(
        benchmark,
        lambda: T.table11_pattern_nds(
            spark, patterns=("2-star", "diamond"), theta=64
        ),
    )
    assert (df.gamma_approx >= df.gamma_heur - 0.2).all()


@pytest.mark.benchmark(group="table12")
def test_bench_table12_friendster_nds(spark, benchmark):
    df = _once(benchmark, lambda: T.table12_friendster_nds(spark, theta=64))
    gam = dict(zip(df.method, df.gamma))
    # heuristic quality is comparable but not better (Table XII shape);
    # wall-clock ordering is reported in EXPERIMENTS.md, not asserted —
    # at lite scale the sampled worlds are tiny and both paths are fast.
    assert gam["heuristic"] <= gam["approx"] + 0.1


@pytest.mark.benchmark(group="table13")
def test_bench_table13_sampling_mpds(spark, benchmark):
    df = _once(benchmark, lambda: T.table13_sampling_mpds(spark))
    st = dict(zip(df.method, df.state_bytes))
    assert st["mc"] < st["lp"]  # MC uses the least sampler memory


@pytest.mark.benchmark(group="table14")
def test_bench_table14_sampling_nds(spark, benchmark):
    df = _once(benchmark, lambda: T.table14_sampling_nds(spark))
    assert set(df.method) == {"mc", "lp", "rss"}


@pytest.mark.benchmark(group="table15")
def test_bench_table15_exact_vs_approx(spark, benchmark):
    df = _once(
        benchmark,
        lambda: T.table15_exact_vs_approx(
            spark, graphs=("BA_7", "ER_7"), theta=500
        ),
    )
    # exact cost explodes with m, approx stays flat (the table's point)
    ba = df[(df.graph == "BA_7") & (df.notion == "edge")].iloc[0]
    er = df[(df.graph == "ER_7") & (df.notion == "edge")].iloc[0]
    assert er.m > ba.m
    assert er.secs_exact > ba.secs_exact
