"""Baselines the paper compares against (§VI-B): expected densest
subgraph (Zou 2013 + App. C clique/pattern extension), deterministic
densest subgraph, probabilistic (k,η)-core (Bonchi et al. 2014), and
probabilistic (k,γ)-truss (Huang et al. 2016)."""
from .dds import deterministic_densest
from .eds import expected_densest
from .ucore import innermost_eta_core
from .utruss import innermost_gamma_truss

__all__ = [
    "expected_densest",
    "deterministic_densest",
    "innermost_eta_core",
    "innermost_gamma_truss",
]
