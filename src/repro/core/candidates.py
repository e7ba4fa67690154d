"""Candidate sets and per-object ancestor pairs.

``V_o`` (candidate values of object ``o``) is the set of distinct values
claimed by the *sources* (workers answer by selecting from ``V_o``, so
answers never extend it). ``G_o(v)`` is the set of candidates that are
ancestors of ``v`` in the hierarchy (root excluded); ``D_o(v)`` its
descendants. Both are derived from the per-object *ancestor-pair*
relation ``(object, value, anc)`` produced here — either from a
:class:`~repro.hierarchy.Hierarchy` or from the numeric rounding rule.
"""
from __future__ import annotations

import pandas as pd

from repro.hierarchy import Hierarchy
from repro.hierarchy.numeric import numeric_ancestor_pairs


def candidate_sets(records: pd.DataFrame) -> pd.DataFrame:
    """Distinct (object, value) pairs, sorted — the candidate sets ``V_o``."""
    return (
        records[["object", "value"]]
        .drop_duplicates()
        .sort_values(["object", "value"])
        .reset_index(drop=True)
    )


def hierarchical_ancestor_pairs(
    candidates: pd.DataFrame, hierarchy: Hierarchy
) -> pd.DataFrame:
    """(object, value, anc) rows with ``anc ∈ G_o(value)``.

    Both endpoints must be candidates of the same object; the hierarchy
    root never appears (the paper excludes it from ``G_o``).
    """
    closure = hierarchy.closure_pdf()  # (desc, anc), root excluded already
    if closure.empty or candidates.empty:
        return pd.DataFrame(columns=["object", "value", "anc"])
    pairs = candidates.merge(closure, left_on="value", right_on="desc")
    pairs = pairs.merge(
        candidates.rename(columns={"value": "anc"}), on=["object", "anc"]
    )
    return (
        pairs[["object", "value", "anc"]]
        .sort_values(["object", "value", "anc"])
        .reset_index(drop=True)
    )


def numeric_ancestor_pairs_df(candidates: pd.DataFrame) -> pd.DataFrame:
    """(object, value, anc) rows under the §3.2 numeric rounding rule."""
    rows: list[tuple[str, str, str]] = []
    for obj, grp in candidates.groupby("object", sort=True):
        for desc, anc in sorted(numeric_ancestor_pairs(list(grp["value"]))):
            rows.append((obj, desc, anc))
    return pd.DataFrame(rows, columns=["object", "value", "anc"])


def object_info(
    records: pd.DataFrame,
    answers: pd.DataFrame | None,
    anc_pairs: pd.DataFrame,
) -> dict[str, dict]:
    """Per-object candidate structure used by the task assigners.

    Maps object → dict with:

    * ``values``: sorted candidate list (local index space),
    * ``anc``: set of (desc_idx, anc_idx) pairs within the candidates,
    * ``cnt``: per-candidate source-claim counts (Pop numerators),
    * ``gen_cnt``: sum of ``cnt`` over each candidate's ancestors,
    * ``S``: |S_o|, ``oh``: whether o ∈ O_H,
    * ``answered_by``: set of workers who already answered ``o``.

    Everything needed to evaluate the worker answer likelihood
    P(v'|v, psi_w) of Eq. (3)/(4) per object.
    """
    cand = candidate_sets(records)
    info: dict[str, dict] = {}
    for obj, grp in cand.groupby("object", sort=True):
        values = list(grp["value"])
        idx = {v: i for i, v in enumerate(values)}
        info[obj] = {
            "values": values,
            "_idx": idx,
            "anc": set(),
            "cnt": pd.Series(0.0, index=range(len(values))).to_numpy(),
            "gen_cnt": None,
            "S": 0.0,
            "oh": False,
            "answered_by": set(),
        }
    for o, v in zip(records["object"], records["value"]):
        info[o]["cnt"][info[o]["_idx"][v]] += 1.0
        info[o]["S"] += 1.0
    if len(anc_pairs):
        for o, v, a in anc_pairs[["object", "value", "anc"]].itertuples(index=False):
            i = info[o]
            i["anc"].add((i["_idx"][v], i["_idx"][a]))
            i["oh"] = True
    for o, i in info.items():
        g = i["cnt"] * 0.0
        for d, a in i["anc"]:
            g[d] += i["cnt"][a]
        i["gen_cnt"] = g
    if answers is not None and len(answers):
        for o, w in zip(answers["object"], answers["worker"]):
            info[o]["answered_by"].add(w)
    return info
