"""CRH — Conflict Resolution on Heterogeneous data (Li et al., SIGMOD'14).

Framework: alternate (1) truth estimation given source weights and
(2) weight estimation ``w_s = -log(loss_s / Σ_s' loss_s')`` given truths.
Categorical attributes use 0-1 loss and weighted voting; numeric
attributes use normalized squared loss and a weighted mean (which is why
CRH is sensitive to outliers in Table 6).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.result import InferenceResult, argmax_truths

_EPS = 1e-9


def crh(
    records: pd.DataFrame,
    answers: pd.DataFrame | None = None,
    *,
    max_iter: int = 20,
) -> InferenceResult:
    """Categorical CRH; worker answers are folded in as extra sources."""
    claims = records[["object", "source", "value"]]
    if answers is not None and len(answers):
        extra = answers.rename(columns={"worker": "source"})
        extra = extra.assign(source="w:" + extra["source"])
        claims = pd.concat([claims, extra[["object", "source", "value"]]], ignore_index=True)
    sources = sorted(claims["source"].unique())
    w = pd.Series(1.0, index=sources)
    truth = None
    for _ in range(max_iter):
        scored = claims.assign(wt=claims["source"].map(w))
        scores = scored.groupby(["object", "value"])["wt"].sum().rename("mu").reset_index()
        new_truth = argmax_truths(scores.rename(columns={"mu": "mu"}).assign(mu=scores["mu"]))
        t_map = dict(zip(new_truth["object"], new_truth["value"]))
        loss = claims.assign(miss=[t_map[o] != v for o, v in zip(claims["object"], claims["value"])])
        loss_s = loss.groupby("source")["miss"].sum().reindex(sources).fillna(0.0) + _EPS
        w = -np.log(loss_s / loss_s.sum())
        w = w.clip(lower=_EPS)
        if truth is not None and t_map == truth:
            truth = t_map
            break
        truth = t_map
    scored = claims.assign(wt=claims["source"].map(w))
    mu = scored.groupby(["object", "value"])["wt"].sum().rename("mu").reset_index()
    mu["mu"] /= mu.groupby("object")["mu"].transform("sum")
    mu = mu.sort_values(["object", "value"]).reset_index(drop=True)
    return InferenceResult(truths=argmax_truths(mu), mu=mu)


def crh_numeric(
    records: pd.DataFrame,
    *,
    max_iter: int = 20,
) -> InferenceResult:
    """Numeric CRH: weighted mean under variance-normalized squared loss."""
    claims = records.assign(x=records["value"].astype(float))
    objs = sorted(claims["object"].unique())
    sources = sorted(claims["source"].unique())
    truth = claims.groupby("object")["x"].median()
    std = claims.groupby("object")["x"].std().fillna(1.0).clip(lower=_EPS)
    w = pd.Series(1.0, index=sources)
    for _ in range(max_iter):
        err = (claims["x"] - claims["object"].map(truth)) / claims["object"].map(std)
        loss_s = (
            (err**2).groupby(claims["source"]).sum().reindex(sources).fillna(0.0) + _EPS
        )
        w = (-np.log(loss_s / loss_s.sum())).clip(lower=_EPS)
        wt = claims["source"].map(w)
        num = (claims["x"] * wt).groupby(claims["object"]).sum()
        den = wt.groupby(claims["object"]).sum()
        new_truth = (num / den).reindex(objs)
        if float((new_truth - truth).abs().max()) < 1e-12:
            truth = new_truth
            break
        truth = new_truth
    truths = pd.DataFrame({"object": objs, "value": truth.reindex(objs).to_numpy()})
    mu = truths.assign(mu=1.0)
    return InferenceResult(truths=truths, mu=mu)
