"""Table 6 — numeric data via the implied rounding hierarchy (§5.8).

MAE and relative error of TDH, LCA, CRH, CATD, VOTE and MEAN on the
three stock attributes.
"""
from __future__ import annotations

import pandas as pd

from repro.baselines.crh import crh_numeric
from repro.baselines.lca import lca
from repro.baselines.numeric import catd, mean_baseline
from repro.baselines.vote import vote
from repro.core.candidates import candidate_sets, numeric_ancestor_pairs_df
from repro.core.tdh_local import TDH
from repro.datagen.stock import ATTRIBUTES, stock_lite
from repro.eval.metrics import mae_re

ALGORITHMS = ["TDH", "LCA", "CRH", "CATD", "VOTE", "MEAN"]

#: Paper Table 6: (MAE, R/E) per attribute
PAPER = {
    ("TDH", "change_rate"): (0.0006, 0.1011),
    ("TDH", "open_price"): (0.0195, 0.0354),
    ("TDH", "eps"): (0.0352, 1.9513),
    ("LCA", "change_rate"): (0.0006, 0.1011),
    ("LCA", "open_price"): (0.0195, 0.0354),
    ("LCA", "eps"): (0.3831, 16.2212),
    ("CRH", "change_rate"): (0.0020, 1.6339),
    ("CRH", "open_price"): (0.0195, 0.0354),
    ("CRH", "eps"): (0.0610, 1.9882),
    ("CATD", "change_rate"): (0.0104, 2.3529),
    ("CATD", "open_price"): (0.0211, 0.0395),
    ("CATD", "eps"): (0.0803, 3.2059),
    ("VOTE", "change_rate"): (0.0006, 0.1011),
    ("VOTE", "open_price"): (0.0195, 0.0354),
    ("VOTE", "eps"): (0.0765, 2.8402),
    ("MEAN", "change_rate"): (0.2837, 30.8747),
    ("MEAN", "open_price"): (0.4047, 0.5782),
    ("MEAN", "eps"): (0.1762, 7.3937),
}


def _run(name: str, records: pd.DataFrame):
    if name == "TDH":
        cand = candidate_sets(records)
        anc = numeric_ancestor_pairs_df(cand)
        return TDH().fit(records, None, anc)
    if name == "LCA":
        return lca(records)
    if name == "CRH":
        return crh_numeric(records)
    if name == "CATD":
        return catd(records)
    if name == "VOTE":
        return vote(records)
    if name == "MEAN":
        return mean_baseline(records)
    raise ValueError(name)


def table6(*, sf: float = 0.1, seed: int = 7, algorithms: list[str] | None = None) -> pd.DataFrame:
    """Reproduce Table 6: per-attribute MAE and R/E for each algorithm."""
    rows = []
    for name in algorithms or ALGORITHMS:
        row: dict = {"algorithm": name}
        for attr in ATTRIBUTES:
            ds = stock_lite(attr, sf=sf, seed=seed)
            res = _run(name, ds.records)
            t = res.truths.copy()
            t["value"] = t["value"].astype(float)
            mae, re_ = mae_re(t, ds.gold)
            row[f"{attr}_mae"], row[f"{attr}_re"] = mae, re_
            paper = PAPER[(name, attr)]
            row[f"paper_{attr}_mae"], row[f"paper_{attr}_re"] = paper
        rows.append(row)
    return pd.DataFrame(rows)
