"""Multi-truth discovery baselines: LTM and DART (paper §5.7).

* **LTM** (Zhao et al., PVLDB'12): per-(object, value) latent Bernoulli
  truth; each source has sensitivity (recall on true values) and
  specificity (on false values) with Beta priors; collapsed Gibbs
  sampling. Output: values whose posterior truth probability ≥ 0.5.
* **DART** (Lin & Chen, PVLDB'18), simplified per DESIGN.md: we keep the
  essence — domain-aware per-source recall/specificity voting with a
  permissive output threshold — which reproduces its characteristic
  high-recall / low-precision behaviour.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.hierarchy import Hierarchy


def _candidate_obs(records: pd.DataFrame):
    """Observation matrix pieces: for each (object, source) the claimed
    candidate, and the per-object candidate lists."""
    cand = (
        records[["object", "value"]].drop_duplicates().sort_values(["object", "value"]).reset_index(drop=True)
    )
    cand["cid"] = np.arange(len(cand))
    cid_of = {(o, v): c for o, v, c in zip(cand["object"], cand["value"], cand["cid"])}
    cands_by_obj: dict[str, np.ndarray] = {
        o: g["cid"].to_numpy() for o, g in cand.groupby("object", sort=True)
    }
    return cand, cid_of, cands_by_obj


def ltm(
    records: pd.DataFrame,
    *,
    n_sweeps: int = 80,
    burn_in: int = 30,
    seed: int = 0,
    sens_prior: tuple[float, float] = (5.0, 2.0),
    spec_prior: tuple[float, float] = (8.0, 2.0),
    truth_prior: float = 0.5,
) -> dict[str, set[str]]:
    """Latent Truth Model via collapsed Gibbs; returns multi-truth sets."""
    rng = np.random.default_rng(seed)
    cand, cid_of, cands_by_obj = _candidate_obs(records)
    sources = sorted(records["source"].unique())
    scode = {s: i for i, s in enumerate(sources)}
    S = len(sources)
    C = len(cand)
    # observation lists: per cid, the (source, obs) pairs for sources covering o
    obs_src: list[list[int]] = [[] for _ in range(C)]
    obs_val: list[list[int]] = [[] for _ in range(C)]
    for o, grp in records.groupby("object", sort=True):
        cids = cands_by_obj[o]
        for s, v in zip(grp["source"], grp["value"]):
            claimed = cid_of[(o, v)]
            for c in cids:
                obs_src[c].append(scode[s])
                obs_val[c].append(1 if c == claimed else 0)
    t = rng.random(C) < 0.5
    # counts n[s, t, obs]
    n = np.zeros((S, 2, 2))
    for c in range(C):
        for s, ob in zip(obs_src[c], obs_val[c]):
            n[s, int(t[c]), ob] += 1
    a1, b1 = sens_prior
    a0, b0 = spec_prior
    totals = np.zeros(C)
    kept = 0
    for sweep in range(n_sweeps):
        for c in range(C):
            cur = int(t[c])
            for s, ob in zip(obs_src[c], obs_val[c]):
                n[s, cur, ob] -= 1
            lp = [np.log(1 - truth_prior), np.log(truth_prior)]
            for s, ob in zip(obs_src[c], obs_val[c]):
                # t=1: Beta-Binomial predictive with sensitivity prior
                p1 = (n[s, 1, 1] + a1) / (n[s, 1, 0] + n[s, 1, 1] + a1 + b1)
                lp[1] += np.log(p1 if ob else 1 - p1)
                # t=0: predictive of false positives (1 - specificity)
                p0 = (n[s, 0, 1] + b0) / (n[s, 0, 0] + n[s, 0, 1] + a0 + b0)
                lp[0] += np.log(p0 if ob else 1 - p0)
            m = max(lp)
            p_true = np.exp(lp[1] - m) / (np.exp(lp[0] - m) + np.exp(lp[1] - m))
            new = rng.random() < p_true
            t[c] = new
            for s, ob in zip(obs_src[c], obs_val[c]):
                n[s, int(new), ob] += 1
        if sweep >= burn_in:
            totals += t
            kept += 1
    post = totals / max(kept, 1)
    out: dict[str, set[str]] = {}
    for o, v, c in zip(cand["object"], cand["value"], cand["cid"]):
        if post[c] >= 0.5:
            out.setdefault(o, set()).add(v)
    # guarantee non-empty output per object (most probable value)
    best = (
        pd.DataFrame({"object": cand["object"], "value": cand["value"], "p": post[cand["cid"]]})
        .sort_values(["object", "p", "value"], ascending=[True, False, True])
        .groupby("object")
        .head(1)
    )
    for o, v in zip(best["object"], best["value"]):
        out.setdefault(o, set()).add(v)
    return out


def dart(
    records: pd.DataFrame,
    *,
    hierarchy: Hierarchy,
    max_iter: int = 10,
    threshold: float = 0.35,
) -> dict[str, set[str]]:
    """Simplified DART: domain-aware recall/specificity voting.

    A permissive threshold keeps recall high (the behaviour Table 5
    reports); precision suffers accordingly.
    """
    from repro.baselines.docs import object_domains

    domains = object_domains(records, hierarchy)
    claims = records.assign(dom=records["object"].map(domains))
    cand, cid_of, cands_by_obj = _candidate_obs(records)
    agents = sorted(set(zip(claims["source"], claims["dom"])))
    acode = {a: i for i, a in enumerate(agents)}
    A = len(agents)
    rho = np.full(A, 0.6)  # recall on true values
    spec = np.full(A, 0.8)  # specificity on false values
    truth_sets: dict[str, set[str]] = {}
    for _ in range(max_iter):
        scores: dict[int, float] = {}
        for o, grp in claims.groupby("object", sort=True):
            cids = cands_by_obj[o]
            claimed_by: dict[int, list[int]] = {int(c): [] for c in cids}
            covering = []
            for s, d, v in zip(grp["source"], grp["dom"], grp["value"]):
                ai = acode[(s, d)]
                covering.append(ai)
                claimed_by[cid_of[(o, v)]].append(ai)
            for c in cids:
                sc = 0.0
                for ai in claimed_by[int(c)]:
                    sc += np.log(rho[ai] / max(1e-6, 1 - spec[ai]))
                for ai in covering:
                    if ai not in claimed_by[int(c)]:
                        # a source claims only one value even when several
                        # are true (the multi-truth setting), so a missing
                        # claim is weak negative evidence — damp it
                        sc += 0.1 * np.log(max(1e-6, 1 - rho[ai]) / spec[ai])
                scores[int(c)] = 1.0 / (1.0 + np.exp(-sc))
        truth_sets = {}
        for o, v, c in zip(cand["object"], cand["value"], cand["cid"]):
            if scores[int(c)] >= threshold:
                truth_sets.setdefault(o, set()).add(v)
        for o in cands_by_obj:
            if o not in truth_sets:
                cids = cands_by_obj[o]
                best = max(cids, key=lambda c: scores[int(c)])
                row = cand[cand["cid"] == best].iloc[0]
                truth_sets[o] = {row["value"]}
        # M-step: recall/specificity from current truth sets
        num_r = np.zeros(A)
        den_r = np.zeros(A)
        num_s = np.zeros(A)
        den_s = np.zeros(A)
        for o, grp in claims.groupby("object", sort=True):
            ts = truth_sets.get(o, set())
            for s, d, v in zip(grp["source"], grp["dom"], grp["value"]):
                ai = acode[(s, d)]
                den_r[ai] += 1
                if v in ts:
                    num_r[ai] += 1
                else:
                    num_s[ai] += 0  # claimed a false value
                den_s[ai] += 1
        new_rho = np.clip((num_r + 2.0) / (den_r + 4.0), 0.05, 0.95)
        new_spec = np.clip(1 - (den_r - num_r + 1.0) / (den_s + 4.0), 0.05, 0.95)
        if np.allclose(new_rho, rho, atol=1e-6) and np.allclose(new_spec, spec, atol=1e-6):
            rho, spec = new_rho, new_spec
            break
        rho, spec = new_rho, new_spec
    return truth_sets
