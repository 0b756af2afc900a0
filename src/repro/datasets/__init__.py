"""Datasets: real Karate Club topology + synthetic stand-ins (DESIGN §4)."""
from .karate import karate_club
from .intel import intel_lab
from .lastfm import lastfm
from .big import biomine_lite, friendster_lite, hs_lite, twitter_lite
from .synth_small import ba_graph, er_graph, fig1_graph
from .brain import brain_networks

__all__ = [
    "karate_club", "intel_lab", "lastfm", "hs_lite", "biomine_lite",
    "twitter_lite", "friendster_lite", "ba_graph", "er_graph",
    "fig1_graph", "brain_networks",
]
