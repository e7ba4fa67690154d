"""Common result container for every truth-inference algorithm."""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd


@dataclass
class InferenceResult:
    """Output of one truth-inference run.

    Attributes
    ----------
    truths:
        (object, value) — the estimated truth ``v_o^*`` per object.
    mu:
        (object, value, mu) — confidence distribution over candidates.
        Baselines without a probabilistic model report normalized scores
        here so entropy/QASCA-style assigners can still consume them.
    phi / psi:
        (source, phi1..3) / (worker, psi1..3) trustworthiness
        distributions; ``None`` for algorithms that do not model them.
    N / D:
        The numerator table (object, value, N) and denominator table
        (object, D) of the paper's Eq. (9), kept for the incremental EM
        of the EAI task assigner (Eq. 17–18). ``None`` for baselines.
    worker_accuracy:
        (worker, acc) — scalar worker reliability for algorithms with a
        symmetric worker model (used by QASCA/MB with baselines).
    """

    truths: pd.DataFrame
    mu: pd.DataFrame
    phi: pd.DataFrame | None = None
    psi: pd.DataFrame | None = None
    N: pd.DataFrame | None = None
    D: pd.DataFrame | None = None
    worker_accuracy: pd.DataFrame | None = None
    extras: dict = field(default_factory=dict)

    def truth_map(self) -> dict[str, str]:
        return dict(zip(self.truths["object"], self.truths["value"]))

    def mu_map(self) -> dict[str, dict[str, float]]:
        out: dict[str, dict[str, float]] = {}
        for obj, v, m in self.mu[["object", "value", "mu"]].itertuples(index=False):
            out.setdefault(obj, {})[v] = float(m)
        return out


def argmax_truths(mu: pd.DataFrame) -> pd.DataFrame:
    """Deterministic argmax of ``mu`` per object (ties → smallest value)."""
    s = mu.sort_values(["object", "mu", "value"], ascending=[True, False, True])
    return (
        s.groupby("object", sort=True)
        .head(1)[["object", "value"]]
        .reset_index(drop=True)
    )
