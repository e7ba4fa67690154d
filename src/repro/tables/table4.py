"""Table 4 — Accuracy of inference × assignment combinations after the
final crowdsourcing round (paper: the 50th round).

Runs every feasible combination (the paper's '-' cells are skipped) of
the 10 inference algorithms and 4 task assigners through the simulated
crowdsourcing loop. Combinations are independent, so the harness can
fan them out over worker processes.
"""
from __future__ import annotations

from concurrent.futures import ProcessPoolExecutor

import pandas as pd

from repro.datagen.truthdata import birthplaces_lite, heritages_lite
from repro.eval.simulate import FEASIBLE, run_crowdsourcing

#: Paper Table 4 (accuracy after round 50); None = infeasible '-'.
PAPER = {
    ("TDH", "EAI"): (0.9601, 0.9304),
    ("TDH", "QASCA"): (0.9500, 0.8999),
    ("TDH", "ME"): (0.9109, 0.8884),
    ("DOCS", "MB"): (0.9052, 0.7546),
    ("DOCS", "QASCA"): (0.9341, 0.7661),
    ("DOCS", "ME"): (0.8842, 0.7631),
    ("LCA", "QASCA"): (0.8823, 0.7136),
    ("LCA", "ME"): (0.9089, 0.8507),
    ("POPACCU", "QASCA"): (0.9295, 0.7512),
    ("POPACCU", "ME"): (0.8987, 0.8336),
    ("ACCU", "QASCA"): (0.8468, 0.5796),
    ("ACCU", "ME"): (0.8257, 0.5896),
    ("ASUMS", "ME"): (0.8700, 0.7427),
    ("CRH", "ME"): (0.9000, 0.8459),
    ("MDC", "ME"): (0.8254, 0.7241),
    ("LFC", "ME"): (0.8287, 0.7327),
    ("VOTE", "ME"): (0.8261, 0.8634),
}


def combos() -> list[tuple[str, str]]:
    return [(i, a) for i, assigns in FEASIBLE.items() for a in sorted(assigns)]


def _run_one(args) -> dict:
    dataset, sf, seed, infer, assign, rounds = args
    mk = birthplaces_lite if dataset == "bp" else heritages_lite
    ds = mk(sf=sf, seed=seed)
    log = run_crowdsourcing(ds, infer, assign, rounds=rounds, seed=seed + 7)
    h = log.history
    return {
        "dataset": dataset,
        "inference": infer,
        "assignment": assign,
        "accuracy": float(h["accuracy"].iloc[-1]),
        "accuracy_r0": float(h["accuracy"].iloc[0]),
        "rounds": rounds,
    }


def table4(
    *,
    sf: float = 1.0,
    rounds: int = 50,
    seed: int = 0,
    max_workers: int = 1,
    subset: list[tuple[str, str]] | None = None,
) -> pd.DataFrame:
    """Reproduce Table 4; each cell is the final-round accuracy."""
    jobs = []
    for dataset, dseed in (("bp", seed), ("her", seed + 1)):
        for infer, assign in subset or combos():
            jobs.append((dataset, sf, dseed, infer, assign, rounds))
    if max_workers > 1:
        with ProcessPoolExecutor(max_workers=max_workers) as ex:
            rows = list(ex.map(_run_one, jobs))
    else:
        rows = [_run_one(j) for j in jobs]
    out = pd.DataFrame(rows)
    out["paper"] = [
        (PAPER.get((r.inference, r.assignment)) or (None, None))[0 if r.dataset == "bp" else 1]
        for r in out.itertuples()
    ]
    return out
