"""Synthetic hierarchy generator.

Stands in for the IMDb-derived geographic hierarchies of the paper's
*BirthPlaces* (4,999 nodes, height 5) and *Heritages* (1,027 nodes,
height 6) datasets. The generator produces a rooted tree with a given
per-level branching profile and optional random pruning so subtree sizes
vary (real geographic hierarchies are unbalanced).

Deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np

from repro.hierarchy.tree import ROOT, Hierarchy


def generate_hierarchy(
    branching: list[int],
    *,
    seed: int = 0,
    keep_prob: float = 1.0,
) -> Hierarchy:
    """Generate a tree with ``len(branching)`` levels below the root.

    Level ``i`` (1-based) nodes each have ``branching[i]`` children drawn
    at level ``i+1``; each non-level-1 node is kept with probability
    ``keep_prob`` (subtrees of dropped nodes are never created), which
    yields unbalanced trees like real geography.

    Node names encode their path, e.g. ``n2_3.1`` is the first child of
    the third level-1 node — handy when eyeballing test failures.
    """
    if not branching:
        raise ValueError("branching profile must be non-empty")
    rng = np.random.default_rng(seed)
    parent: dict[str, str | None] = {ROOT: None}
    frontier: list[tuple[str, str]] = [(ROOT, "")]  # (node, path)
    for level, fanout in enumerate(branching, start=1):
        nxt: list[tuple[str, str]] = []
        for node, path in frontier:
            for j in range(1, fanout + 1):
                if level > 1 and rng.random() > keep_prob:
                    continue
                cpath = f"{path}.{j}" if path else str(j)
                child = f"n{level}_{cpath}"
                parent[child] = node
                nxt.append((child, cpath))
        frontier = nxt
    return Hierarchy(parent)
