"""Uniform random-walk sampling — GraphSAINT's default subgraph sampler
(paper §II-B), the baseline of Figure 2 and Table III.

Roots are drawn uniformly from *all* vertices, with no regard for node or
edge types, then expanded by length-``h`` walks; the sample is the induced
subgraph over visited vertices. This is the method whose samples
under-represent targets and retain target-disconnected noise.
"""
from __future__ import annotations

from repro.core.subgraph import induced_subgraph
from repro.core.walks import random_walk_visited, sample_vertices
from repro.kg.schema import KG


def urw_sample(kg: KG, *, bs: int, h: int, seed: int = 0) -> KG:
    """Sample ``bs`` uniform roots, walk ``h`` hops, induce the subgraph."""
    roots = sample_vertices(kg.nodes, bs, seed=seed)
    visited = random_walk_visited(kg, roots, h, seed=seed)
    return induced_subgraph(kg, visited, name=f"{kg.name}-URW")
