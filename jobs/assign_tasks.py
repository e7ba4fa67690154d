"""Task-assignment job: distributed N/D/U_EAI aggregation + Algorithm 1.

The heavy statistics of Lemma 4.1 — the Eq. (9) numerator/denominator
tables and the per-object upper bound — come from the TDH Spark fit; the
heap phase of Algorithm 1 is inherently sequential and runs on the
collected O(|O|) frontier.

Usage: spark-submit jobs/assign_tasks.py [--dataset bp|her] [--sf 0.1] [--k 5]
"""
from __future__ import annotations

import argparse

import numpy as np
from _common import get_spark

from repro.assign.common import AssignContext
from repro.assign.eai import eai_assign
from repro.core.candidates import candidate_sets, hierarchical_ancestor_pairs
from repro.core.tdh_spark import TDHSpark
from repro.datagen.truthdata import birthplaces_lite, heritages_lite


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", choices=["bp", "her"], default="bp")
    ap.add_argument("--sf", type=float, default=0.1)
    ap.add_argument("--seed", type=int, default=0)
    ap.add_argument("--workers", type=int, default=10)
    ap.add_argument("--k", type=int, default=5)
    args = ap.parse_args()
    spark = get_spark("tdh-task-assignment")
    mk = birthplaces_lite if args.dataset == "bp" else heritages_lite
    ds = mk(sf=args.sf, seed=args.seed)
    cand = candidate_sets(ds.records)
    anc = hierarchical_ancestor_pairs(cand, ds.hierarchy)
    res = TDHSpark(spark).fit(
        spark.createDataFrame(ds.records), None, spark.createDataFrame(anc)
    )
    ctx = AssignContext(
        result=res,
        workers=[f"w{i}" for i in range(args.workers)],
        k=args.k,
        answered={},
        rng=np.random.default_rng(args.seed),
    )
    assignment = eai_assign(ctx)
    print(f"[assign] EAI evaluations: {res.extras.get('_eai_evals')}")
    for w, objs in assignment.items():
        print(f"[assign] {w}: {objs}")
    spark.stop()


if __name__ == "__main__":
    main()
