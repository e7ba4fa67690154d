"""ACCU and POPACCU (Dong et al., PVLDB'09 / PVLDB'12).

Bayesian truth discovery with source accuracies and pairwise source
*dependence* (copy) detection:

* ACCU assumes the ``n_o = |V_o| - 1`` false values are uniformly
  likely; a claim's vote count is ``ln(n_o · A_s / (1 - A_s))``.
* POPACCU replaces the uniform false-value assumption with the observed
  popularity of each false value.
* Both discount votes from likely copiers: for each ordered pair of
  sources sharing enough objects, the posterior copy probability is
  computed from the numbers of shared true / shared false / differing
  values, and a source's vote on a value is multiplied by
  ``Π (1 - c · P(dep))`` over more-accurate sources making the same
  claim (the paper notes this dependence computation is why
  ACCU/POPACCU are the slowest algorithms on *Heritages*).
"""
from __future__ import annotations

import itertools

import numpy as np
import pandas as pd

from repro.core.result import InferenceResult, argmax_truths

_EPS = 1e-6


def _pair_dependence(
    claims: pd.DataFrame,
    truth_map: dict[str, str],
    acc: pd.Series,
    *,
    copy_prob: float,
    dep_prior: float,
    min_shared: int = 3,
) -> dict[tuple[str, str], float]:
    """Posterior P(dependent) per unordered source pair sharing objects."""
    by_obj = claims.groupby("object")
    pair_stats: dict[tuple[str, str], list[int]] = {}
    for o, grp in by_obj:
        t = truth_map.get(o)
        rows = list(zip(grp["source"], grp["value"]))
        for (s1, v1), (s2, v2) in itertools.combinations(sorted(rows), 2):
            key = (s1, s2)
            st = pair_stats.setdefault(key, [0, 0, 0])  # kt, kf, kd
            if v1 == v2:
                st[0 if v1 == t else 1] += 1
            else:
                st[2] += 1
    nbar = max(2.0, claims.groupby("object")["value"].nunique().mean())
    out: dict[tuple[str, str], float] = {}
    for (s1, s2), (kt, kf, kd) in pair_stats.items():
        if kt + kf + kd < min_shared:
            continue
        a1 = float(np.clip(acc.get(s1, 0.8), 0.05, 0.95))
        a2 = float(np.clip(acc.get(s2, 0.8), 0.05, 0.95))
        same_t_i = a1 * a2
        same_f_i = (1 - a1) * (1 - a2) / nbar
        diff_i = max(_EPS, 1 - same_t_i - same_f_i)
        c = copy_prob
        same_t_d = c * a1 + (1 - c) * same_t_i
        same_f_d = c * (1 - a1) + (1 - c) * same_f_i
        diff_d = max(_EPS, (1 - c) * diff_i)
        ll_i = kt * np.log(same_t_i) + kf * np.log(same_f_i) + kd * np.log(diff_i)
        ll_d = kt * np.log(same_t_d) + kf * np.log(same_f_d) + kd * np.log(diff_d)
        m = max(ll_i, ll_d)
        li, ld = np.exp(ll_i - m), np.exp(ll_d - m)
        out[(s1, s2)] = float(dep_prior * ld / (dep_prior * ld + (1 - dep_prior) * li))
    return out


def _accu_core(
    records: pd.DataFrame,
    answers: pd.DataFrame | None,
    *,
    popularity: bool,
    max_iter: int = 10,
    copy_prob: float = 0.8,
    dep_prior: float = 0.1,
    detect_dependence: bool = True,
) -> InferenceResult:
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
    acc = pd.Series(0.8, index=sources)

    # expanded (claim × candidate) arrays for the exact per-candidate
    # likelihood: P(claim|v true) = A_s if claim=v else (1-A_s)·q where q
    # is 1/n_o (ACCU) or the popularity of the claim among non-v values
    # (POPACCU).
    cand = (
        claims[["object", "value"]].drop_duplicates().sort_values(["object", "value"]).reset_index(drop=True)
    )
    objects = sorted(cand["object"].unique())
    ocode = {o: i for i, o in enumerate(objects)}
    cand["cid"] = np.arange(len(cand))
    cid_of = {(o, v): c for o, v, c in zip(cand["object"], cand["value"], cand["cid"])}
    obj_of_cand = cand["object"].map(ocode).to_numpy()
    nV = np.bincount(obj_of_cand).astype(float)
    cnt_ser = claims.groupby(["object", "value"]).size()
    cnt = np.zeros(len(cand))
    for (o, v), k in cnt_ser.items():
        cnt[cid_of[(o, v)]] = k
    S_o = np.bincount(claims["object"].map(ocode).to_numpy(), minlength=len(objects)).astype(float)
    cands_by_obj = {int(k): g["cid"].to_numpy() for k, g in cand.groupby(cand["object"].map(ocode))}
    rows, srcs, cids, eq, claim_cid_col = [], [], [], [], []
    for i, (o, s, v) in enumerate(zip(claims["object"], claims["source"], claims["value"])):
        ccid = cid_of[(o, v)]
        for c in cands_by_obj[ocode[o]]:
            rows.append(i)
            srcs.append(scode[s])
            cids.append(c)
            eq.append(c == ccid)
            claim_cid_col.append(ccid)
    rows_a, srcs_a = np.asarray(rows), np.asarray(srcs)
    cids_a, eq_a = np.asarray(cids), np.asarray(eq)
    claim_cid_a = np.asarray(claim_cid_col)
    claim_cids = np.asarray(
        [cid_of[(o, v)] for o, v in zip(claims["object"], claims["value"])]
    )
    if popularity:
        # pop of the claimed value among values ≠ v: cnt(claim)/(S_o - cnt(v))
        q = cnt[claim_cid_a] / np.clip(S_o[obj_of_cand[cids_a]] - cnt[cids_a], 1.0, None)
    else:
        q = 1.0 / np.clip(nV[obj_of_cand[cids_a]] - 1.0, 1.0, None)

    mu = None
    truth_map: dict[str, str] = {}
    dep: dict[tuple[str, str], float] = {}
    indep = np.ones(len(claims))
    for it in range(max_iter):
        if detect_dependence and it > 0:
            dep = _pair_dependence(
                claims, truth_map, acc, copy_prob=copy_prob, dep_prior=dep_prior
            )
            indep = np.ones(len(claims))
            if dep:
                a_row = claims["source"].map(acc)
                for _, grp in claims.assign(acc=a_row).groupby(["object", "value"]):
                    if len(grp) < 2:
                        continue
                    order = grp.sort_values("acc", ascending=False)
                    seen: list[str] = []
                    for idx, s in zip(order.index, order["source"]):
                        w = 1.0
                        for s2 in seen:
                            key = (min(s, s2), max(s, s2))
                            w *= 1.0 - copy_prob * dep.get(key, 0.0)
                        indep[idx] = w
                        seen.append(s)
        a_s = np.clip(acc.to_numpy()[srcs_a], 0.01, 0.99)
        p = np.where(eq_a, a_s, (1.0 - a_s) * np.clip(q, 1e-12, None))
        # dependence discount: copiers' log-votes count fractionally
        ll_rows = np.log(p) * indep[rows_a]
        log_lik = np.zeros(len(cand))
        np.add.at(log_lik, cids_a, ll_rows)
        mx = np.full(len(objects), -np.inf)
        np.maximum.at(mx, obj_of_cand, log_lik)
        post = np.exp(log_lik - mx[obj_of_cand])
        z = np.bincount(obj_of_cand, post, minlength=len(objects))
        post /= z[obj_of_cand]
        mu = pd.DataFrame({"object": cand["object"], "value": cand["value"], "mu": post})
        truths = argmax_truths(mu)
        truth_map = dict(zip(truths["object"], truths["value"]))
        cp = pd.Series(post[claim_cids], index=claims.index)
        new_acc = (cp.groupby(claims["source"]).sum() + 1.0) / (
            cp.groupby(claims["source"]).size() + 2.0
        )
        new_acc = new_acc.reindex(sources).fillna(0.8)
        if float((new_acc - acc).abs().max()) < 1e-6:
            acc = new_acc
            break
        acc = new_acc
    mu = mu.sort_values(["object", "value"]).reset_index(drop=True)
    wacc = None
    if workers:
        wacc = pd.DataFrame(
            {"worker": workers, "acc": [float(acc.get(f"w:{w}", 0.8)) for w in workers]}
        )
    return InferenceResult(
        truths=argmax_truths(mu),
        mu=mu,
        worker_accuracy=wacc,
        extras={"accuracy": acc, "dependence": dep},
    )


def accu(records: pd.DataFrame, answers: pd.DataFrame | None = None, **kw) -> InferenceResult:
    """ACCU: uniform false-value distribution + dependence detection."""
    return _accu_core(records, answers, popularity=False, **kw)


def popaccu(records: pd.DataFrame, answers: pd.DataFrame | None = None, **kw) -> InferenceResult:
    """POPACCU: popularity-based false-value distribution + dependence."""
    return _accu_core(records, answers, popularity=True, **kw)
