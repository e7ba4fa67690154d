"""Synthetic numeric stock workload (stand-in for Li et al.'s stock data [23]).

The paper's Table 6 uses trading data for 1,000 stock symbols from 55
sources and evaluates on three attributes: *change rate*, *open price*
and *EPS*. We generate per-attribute truths and per-source claimed
values that reproduce the phenomena the experiment probes:

* sources report at different precisions (significant digits), creating
  the implied rounding hierarchy of §3.2;
* some sources are sloppy (relative perturbations) and a few emit
  extreme outliers (scale errors), which punish averaging methods
  (MEAN, CATD) but not candidate-selection methods (TDH, VOTE, LCA).

Claimed values are decimal *strings* so precision is preserved.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

ATTRIBUTES = ("change_rate", "open_price", "eps")


@dataclass
class StockDataset:
    """Numeric truth-discovery workload for a single attribute."""

    attribute: str
    records: pd.DataFrame  # columns: object, source, value (decimal string)
    gold: pd.DataFrame  # columns: object, truth (float)


def _truths(rng: np.random.Generator, attribute: str, n: int) -> np.ndarray:
    if attribute == "change_rate":
        return np.round(rng.normal(0.0, 0.02, n), 4)
    if attribute == "open_price":
        return np.round(np.exp(rng.normal(3.0, 1.0, n)) + 1.0, 2)
    if attribute == "eps":
        return np.round(rng.gamma(2.0, 0.5, n) + 0.01, 2)
    raise ValueError(f"unknown attribute {attribute!r}")


def _base_decimals(attribute: str) -> int:
    return 4 if attribute == "change_rate" else 2


def stock_lite(
    attribute: str, *, sf: float = 0.01, seed: int = 7
) -> StockDataset:
    """Generate the workload for one attribute at scale factor ``sf``.

    SF=1 ≈ paper scale (1,000 objects × 55 sources, ~50% coverage).
    """
    if attribute not in ATTRIBUTES:
        raise ValueError(f"attribute must be one of {ATTRIBUTES}")
    rng = np.random.default_rng(seed + ATTRIBUTES.index(attribute))
    n_obj = max(15, int(1000 * sf))
    n_src = max(8, int(55 * min(1.0, sf * 10)))
    truths = _truths(rng, attribute, n_obj)
    base_dp = _base_decimals(attribute)
    # per-source behaviour: precision tendency + error profile. Outliers
    # (unit/scale errors) are *idiosyncratic* — any source can emit one —
    # so no algorithm can sanitize them by just down-weighting a fixed
    # set of bad sources; averaging methods (MEAN, CATD) pay the price.
    if attribute == "eps":  # EPS reporting rounds aggressively in the wild
        src_dp_drop = rng.choice([0, 1, 1, 2, 2], n_src)
    else:
        src_dp_drop = rng.choice([0, 0, 1, 1, 2], n_src)
    src_err = rng.choice([0.05, 0.10, 0.30], n_src, p=[0.5, 0.3, 0.2])
    rows: list[tuple[str, str, str]] = []
    for i in range(n_obj):
        o = f"o{i}"
        t = truths[i]
        srcs = [j for j in range(n_src) if rng.random() < 0.5]
        if len(srcs) < 2:
            srcs = list(rng.choice(n_src, 2, replace=False))
        for j in srcs:
            dp = max(0, base_dp - int(src_dp_drop[j]))
            if rng.random() < 0.04:
                v = t * float(rng.choice([100.0, 0.01, -10.0]))  # scale error
            elif rng.random() < src_err[j]:
                # heavy-tailed sloppy perturbation (Student-t, df=2):
                # candidate-selection shrugs it off, averaging does not
                v = t * (1.0 + float(rng.standard_t(2)) * 0.15)
            else:
                v = t
            rows.append((o, f"s{j}", f"{v:.{dp}f}"))
    records = (
        pd.DataFrame(rows, columns=["object", "source", "value"])
        .drop_duplicates(["object", "source"])
        .sort_values(["object", "source"])
        .reset_index(drop=True)
    )
    gold = pd.DataFrame({"object": [f"o{i}" for i in range(n_obj)], "truth": truths})
    return StockDataset(attribute, records, gold)
