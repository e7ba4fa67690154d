"""LFC — Learning From Crowds (Raykar et al., JMLR'10), categorical.

Each agent gets a confusion matrix over candidate-value *positions*
(objects have different candidate sets, so, as in the truth-inference
survey of Zheng et al., the label space is the position within the
sorted candidate list, padded to the maximum |V_o|). The paper notes the
confusion matrix is "the square of the number of candidate values",
making LFC the slowest algorithm on *BirthPlaces* — this construction
reproduces that cost profile.

``lfc`` returns the single-truth MAP estimate; ``lfc_mt`` is the
multi-truth variant (§5.7) that outputs every value whose posterior
exceeds a threshold.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.result import InferenceResult, argmax_truths


def _fit(
    records: pd.DataFrame,
    answers: pd.DataFrame | None,
    max_iter: int,
    tol: float,
    smooth: float,
):
    claims = records[["object", "source", "value"]]
    workers: list[str] = []
    if answers is not None and len(answers):
        extra = answers.rename(columns={"worker": "source"})
        extra = extra.assign(source="w:" + extra["source"])
        workers = sorted(answers["worker"].unique())
        claims = pd.concat([claims, extra[["object", "source", "value"]]], ignore_index=True)
    claims = claims.reset_index(drop=True)
    sources = sorted(claims["source"].unique())
    scode = {s: i for i, s in enumerate(sources)}
    cand = (
        claims[["object", "value"]].drop_duplicates().sort_values(["object", "value"]).reset_index(drop=True)
    )
    objects = sorted(cand["object"].unique())
    ocode = {o: i for i, o in enumerate(objects)}
    pos_of: dict[tuple[str, str], int] = {}
    cands_by_obj: dict[int, list[str]] = {}
    for o, grp in cand.groupby("object", sort=True):
        vals = list(grp["value"])
        cands_by_obj[ocode[o]] = vals
        for j, v in enumerate(vals):
            pos_of[(o, v)] = j
    K = max(len(v) for v in cands_by_obj.values())
    S = len(sources)
    nO = len(objects)
    nK = np.asarray([len(cands_by_obj[i]) for i in range(nO)])

    c_obj = claims["object"].map(ocode).to_numpy()
    c_src = claims["source"].map(scode).to_numpy()
    c_pos = np.asarray([pos_of[(o, v)] for o, v in zip(claims["object"], claims["value"])])

    pi = np.full((S, K, K), 0.3 / max(1, K - 1))
    for j in range(K):
        pi[:, j, j] = 0.7
    # truth posterior per (object, position), masked beyond |V_o|
    mask = np.arange(K)[None, :] < nK[:, None]
    mu = np.where(mask, 1.0, 0.0)
    mu = mu / mu.sum(axis=1, keepdims=True)
    for _ in range(max_iter):
        log_mu = np.where(mask, 0.0, -np.inf)  # uniform prior over valid positions
        contrib = np.log(np.clip(pi[c_src, :, c_pos], 1e-300, None))  # (n_claims, K)
        np.add.at(log_mu, c_obj, contrib)
        mx = log_mu.max(axis=1, keepdims=True)
        new_mu = np.exp(log_mu - mx) * mask
        new_mu /= new_mu.sum(axis=1, keepdims=True)
        # M: confusion matrices
        num = np.full((S, K, K), smooth)
        np.add.at(num, (c_src, slice(None), c_pos), new_mu[c_obj])
        pi = num / num.sum(axis=2, keepdims=True)
        if float(np.max(np.abs(new_mu - mu))) < tol:
            mu = new_mu
            break
        mu = new_mu
    rows = []
    for i in range(nO):
        o = objects[i]
        for j, v in enumerate(cands_by_obj[i]):
            rows.append((o, v, float(mu[i, j])))
    mu_df = pd.DataFrame(rows, columns=["object", "value", "mu"])
    wacc = None
    if workers:
        diag = pi[np.arange(S)][:, np.arange(K), np.arange(K)].mean(axis=1)
        wacc = pd.DataFrame(
            {"worker": workers, "acc": [float(diag[scode[f"w:{w}"]]) for w in workers]}
        )
    return mu_df, wacc


def lfc(
    records: pd.DataFrame,
    answers: pd.DataFrame | None = None,
    *,
    max_iter: int = 50,
    tol: float = 1e-6,
    smooth: float = 0.3,
) -> InferenceResult:
    """Single-truth LFC (confusion-matrix EM)."""
    mu, wacc = _fit(records, answers, max_iter, tol, smooth)
    return InferenceResult(truths=argmax_truths(mu), mu=mu, worker_accuracy=wacc)


def lfc_mt(
    records: pd.DataFrame,
    answers: pd.DataFrame | None = None,
    *,
    threshold: float = 0.3,
    **kw,
) -> dict[str, set[str]]:
    """LFC-MT: all values with posterior ≥ threshold (at least the argmax)."""
    res = lfc(records, answers, **kw)
    out: dict[str, set[str]] = {}
    for o, v, m in res.mu.itertuples(index=False):
        if m >= threshold:
            out.setdefault(o, set()).add(v)
    for o, v in zip(res.truths["object"], res.truths["value"]):
        out.setdefault(o, set()).add(v)
    return out
