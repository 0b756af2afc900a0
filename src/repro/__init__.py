"""Reproduction of "Most Probable Densest Subgraphs" (ICDE 2023).

Subpackages:
  core        — MPDS/NDS sampling algorithms (the paper's contribution)
  graphs      — per-possible-world deterministic-graph kernels
  baselines   — EDS / DDS / (k,η)-core / (k,γ)-truss
  spark_graph — DataFrame/Catalyst graph dataflow (oracle-checked)
  datasets    — Karate Club + synthetic stand-ins (DESIGN.md §4)
  experiments — one harness per evaluation table
"""

__version__ = "0.1.0"
