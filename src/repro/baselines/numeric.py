"""Numeric truth-discovery baselines for Table 6: CATD and MEAN.

* **CATD** (Li et al., PVLDB'14): confidence-aware source weighting —
  ``w_s = chi2_{alpha/2}(|O_s|) / Σ_o (x_{s,o} - t_o)²`` (the lower
  chi-square quantile shrinks the weight of sources with few claims);
  truths are the weighted mean, iterated to a fixed point. Like MEAN it
  averages claimed values, so outliers hurt it (the paper's point).
* **MEAN**: plain average of the claimed values.

The chi-square quantile uses the Wilson–Hilferty approximation (scipy is
not available in this container; the approximation is accurate to ~1e-3
for the df ranges that occur here and is exercised in tests).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.result import InferenceResult

_Z_025 = -1.9599639845400545  # Phi^{-1}(0.025)


def chi2_quantile(p_z: float, df: float) -> float:
    """Wilson–Hilferty chi-square quantile for a given normal quantile."""
    df = max(df, 1.0)
    h = 2.0 / (9.0 * df)
    return df * (1.0 - h + p_z * np.sqrt(h)) ** 3


def mean_baseline(records: pd.DataFrame) -> InferenceResult:
    """MEAN: per-object average of claimed values (outlier-sensitive)."""
    x = records.assign(x=records["value"].astype(float))
    t = x.groupby("object")["x"].mean().rename("value").reset_index()
    return InferenceResult(truths=t, mu=t.assign(mu=1.0))


def catd(
    records: pd.DataFrame,
    *,
    max_iter: int = 20,
    tol: float = 1e-10,
) -> InferenceResult:
    """CATD with weighted-mean truths."""
    claims = records.assign(x=records["value"].astype(float))
    objs = sorted(claims["object"].unique())
    sources = sorted(claims["source"].unique())
    nO_s = claims.groupby("source").size().reindex(sources)
    truth = claims.groupby("object")["x"].median()
    for _ in range(max_iter):
        err2 = (claims["x"] - claims["object"].map(truth)) ** 2
        loss_s = err2.groupby(claims["source"]).sum().reindex(sources).fillna(0.0) + 1e-12
        w = pd.Series(
            [chi2_quantile(_Z_025, float(nO_s[s])) for s in sources], index=sources
        ) / loss_s
        wt = claims["source"].map(w)
        num = (claims["x"] * wt).groupby(claims["object"]).sum()
        den = wt.groupby(claims["object"]).sum()
        new_truth = (num / den).reindex(objs)
        if float((new_truth - truth.reindex(objs)).abs().max()) < tol:
            truth = new_truth
            break
        truth = new_truth
    t = pd.DataFrame({"object": objs, "value": truth.reindex(objs).to_numpy()})
    return InferenceResult(truths=t, mu=t.assign(mu=1.0))
