"""Synthetic graph substrate.

Deterministic generators for (a) power-law transaction/social graphs with
planted dense fraud communities and (b) bipartite customer–merchant
transaction networks, plus a registry of scaled-down analogues of the 8
datasets in the paper's Table 4 (see DESIGN.md §3 for the substitution
rationale).
"""
from repro.graphgen.generators import (
    bipartite_fraud_graph,
    chung_lu_with_communities,
)
from repro.graphgen.datasets import DATASETS, load_dataset

__all__ = [
    "bipartite_fraud_graph",
    "chung_lu_with_communities",
    "DATASETS",
    "load_dataset",
]
