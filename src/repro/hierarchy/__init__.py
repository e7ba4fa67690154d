"""Hierarchy substrate: tree structure, synthetic generators, numeric implied hierarchy."""
from repro.hierarchy.tree import Hierarchy
from repro.hierarchy.generator import generate_hierarchy

__all__ = ["Hierarchy", "generate_hierarchy"]
