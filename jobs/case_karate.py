#!/usr/bin/env python
"""§VI-E Karate Club case study: MPDS community purity vs DDS/EDS/core/truss.

Prints each notion's node set, its ground-truth community split, and
purity — the tabular content behind the paper's Figures 6-7.
"""
from _common import session

from repro.baselines import (
    deterministic_densest,
    expected_densest,
    innermost_eta_core,
    innermost_gamma_truss,
)
from repro.core.mpds import topk_mpds
from repro.datasets import karate_club
from repro.experiments.common import purity

if __name__ == "__main__":
    spark = session("mpds-karate")
    spark.sparkContext.setLogLevel("ERROR")
    ug = karate_club()
    comm = ug.meta["communities"]
    res = topk_mpds(spark, ug, k=3, theta=160)
    for i, (s, tau) in enumerate(res.top, 1):
        print(f"MPDS#{i}: tau={tau:.4f} purity={purity(s, comm):.2f} {sorted(s)}")
    for tag, s in (
        ("DDS  ", deterministic_densest(ug)[0]),
        ("EDS  ", expected_densest(ug)[0]),
        ("core ", innermost_eta_core(ug, 0.1)),
        ("truss", innermost_gamma_truss(ug, 0.1)),
    ):
        print(f"{tag}: purity={purity(s, comm):.2f} size={len(s)} {sorted(s)}")
    spark.stop()
