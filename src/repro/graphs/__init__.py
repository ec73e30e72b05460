"""Network-data substrate: exact graphs, synthetic substitutes, probabilities.

Edge lists are Spark DataFrames with columns ``src`` (int), ``dst`` (int);
influence graphs add ``p`` (double in (0, 1]). Vertices are 0..n-1.
"""
from repro.graphs.csr import CSRGraph, to_csr
from repro.graphs.networks import NETWORKS, build_network
from repro.graphs.probability import assign_probabilities

__all__ = [
    "CSRGraph",
    "to_csr",
    "NETWORKS",
    "build_network",
    "assign_probabilities",
]
