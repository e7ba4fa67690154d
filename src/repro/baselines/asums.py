"""ASUMS — Sums adapted to hierarchies (Beretta et al., WIMS'16).

The only prior algorithm that uses hierarchies: Sums/Hubs-Authorities
iteration where a claim supports its value *and the value's ancestors*
(a specific claim implies its generalizations). Because belief then
monotonically accumulates toward general values, a *threshold* controls
the granularity of the output truth — the drawback the paper highlights:
ASUMS ignores per-source generalization tendencies and needs this knob.

Truth selection: among candidates whose belief is within ``threshold``
of the object's maximum, pick the most specific (deepest; belief as the
tie-break).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.result import InferenceResult
from repro.hierarchy import Hierarchy


def asums(
    records: pd.DataFrame,
    answers: pd.DataFrame | None = None,
    *,
    anc_pairs: pd.DataFrame,
    hierarchy: Hierarchy | None = None,
    depth_of: dict[str, int] | None = None,
    max_iter: int = 20,
    threshold: float = 0.4,
) -> InferenceResult:
    """Hierarchy-aware Sums. ``depth_of`` overrides hierarchy depths
    (used for the numeric implied hierarchy where no tree exists)."""
    claims = records[["object", "source", "value"]]
    if answers is not None and len(answers):
        extra = answers.rename(columns={"worker": "source"})
        extra = extra.assign(source="w:" + extra["source"])
        claims = pd.concat([claims, extra[["object", "source", "value"]]], ignore_index=True)
    claims = claims.reset_index(drop=True)
    sources = sorted(claims["source"].unique())
    scode = {s: i for i, s in enumerate(sources)}
    cand = (
        claims[["object", "value"]].drop_duplicates().sort_values(["object", "value"]).reset_index(drop=True)
    )
    cand["cid"] = np.arange(len(cand))
    cid_of = {(o, v): c for o, v, c in zip(cand["object"], cand["value"], cand["cid"])}

    # support edges: claim row -> claimed cid and every candidate ancestor
    anc_by_desc: dict[int, list[int]] = {}
    for o, v, a in anc_pairs[["object", "value", "anc"]].itertuples(index=False):
        anc_by_desc.setdefault(cid_of[(o, v)], []).append(cid_of[(o, a)])
    sup_src, sup_cid, claim_cids = [], [], []
    for o, s, v in claims[["object", "source", "value"]].itertuples(index=False):
        c = cid_of[(o, v)]
        claim_cids.append(c)
        for target in [c, *anc_by_desc.get(c, [])]:
            sup_src.append(scode[s])
            sup_cid.append(target)
    sup_src_a, sup_cid_a = np.asarray(sup_src), np.asarray(sup_cid)
    claim_cids_a = np.asarray(claim_cids)
    claim_src_a = claims["source"].map(scode).to_numpy()

    trust = np.ones(len(sources))
    belief = np.ones(len(cand))
    for _ in range(max_iter):
        belief = np.bincount(sup_cid_a, trust[sup_src_a], minlength=len(cand))
        belief /= max(belief.max(), 1e-12)
        trust = np.bincount(claim_src_a, belief[claim_cids_a], minlength=len(sources))
        trust /= max(trust.max(), 1e-12)
    mu = pd.DataFrame({"object": cand["object"], "value": cand["value"], "mu": belief})
    mu["mu"] /= mu.groupby("object")["mu"].transform("sum")
    if depth_of is None:
        if hierarchy is None:
            raise ValueError("asums needs either hierarchy or depth_of")
        depth_of = {v: (hierarchy.depth(v) if v in hierarchy else 0) for v in cand["value"]}
    rows = []
    for o, grp in mu.groupby("object", sort=True):
        mx = grp["mu"].max()
        ok = grp[grp["mu"] >= threshold * mx].copy()
        ok["depth"] = ok["value"].map(depth_of)
        ok = ok.sort_values(["depth", "mu", "value"], ascending=[False, False, True])
        rows.append((o, ok.iloc[0]["value"]))
    truths = pd.DataFrame(rows, columns=["object", "value"])
    mu = mu.sort_values(["object", "value"]).reset_index(drop=True)
    return InferenceResult(truths=truths, mu=mu)
