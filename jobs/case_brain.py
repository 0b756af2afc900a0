#!/usr/bin/env python
"""§VI-F brain case study: 3-clique MPDS vs EDS on TD/ASD networks.

Prints the region membership and hemisphere symmetry of each subgraph
(the tabular content behind the paper's Figures 8-11).
"""
from _common import session

from repro.baselines import expected_densest
from repro.core.mpds import topk_mpds
from repro.datasets import brain_networks
from repro.datasets.brain import region_of


def describe(tag, nodes):
    regions = {}
    for v in sorted(nodes):
        regions.setdefault(region_of(v), []).append(v)
    unpaired = sum(1 for v in nodes if (v ^ 1) not in nodes)
    print(f"{tag}: size={len(nodes)} unpaired={unpaired} regions={dict(regions)}")


if __name__ == "__main__":
    spark = session("mpds-brain")
    spark.sparkContext.setLogLevel("ERROR")
    td, asd = brain_networks()
    for name, ug in (("TD", td), ("ASD", asd)):
        mpds = topk_mpds(spark, ug, k=1, theta=160, notion="clique:3").best_set
        eds, _ = expected_densest(ug, "clique:3")
        describe(f"{name} 3-clique MPDS", mpds)
        describe(f"{name} 3-clique EDS ", eds)
    spark.stop()
