"""Clique-counting substrate for the TDS / kCLiDS density metrics.

``local`` enumerates triangles and k-cliques with a degeneracy-ordered
search (the kCLIST approach of Danisch et al.); ``spark`` counts the same
structures with DataFrame self-joins so the Spark engine can peel clique
metrics without leaving Catalyst.
"""
from repro.cliques.local import enumerate_cliques, enumerate_triangles, count_per_vertex

__all__ = ["enumerate_cliques", "enumerate_triangles", "count_per_vertex"]
