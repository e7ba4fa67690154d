"""The paper's primary contribution: TDH hierarchical truth inference."""
from repro.core.result import InferenceResult
from repro.core.tdh_local import TDH
from repro.core.candidates import (
    candidate_sets,
    hierarchical_ancestor_pairs,
    numeric_ancestor_pairs_df,
)

__all__ = [
    "InferenceResult",
    "TDH",
    "candidate_sets",
    "hierarchical_ancestor_pairs",
    "numeric_ancestor_pairs_df",
]
