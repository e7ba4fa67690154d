"""Benchmark for Table 3: truth inference at SF=0.1.

Covers the TDH Spark engine (the distributed path), the local reference
engine, and the Spark VOTE baseline.
"""
import pytest

from repro.baselines.vote import vote_spark
from repro.core.candidates import candidate_sets, hierarchical_ancestor_pairs
from repro.core.tdh_local import TDH
from repro.core.tdh_spark import TDHSpark
from repro.datagen.truthdata import birthplaces_lite


@pytest.fixture(scope="module")
def problem():
    ds = birthplaces_lite(sf=0.1, seed=0)
    cand = candidate_sets(ds.records)
    anc = hierarchical_ancestor_pairs(cand, ds.hierarchy)
    return ds, anc


def test_tdh_local_inference(benchmark, problem):
    ds, anc = problem
    res = benchmark.pedantic(
        lambda: TDH(max_iter=60).fit(ds.records, None, anc), rounds=3, iterations=1
    )
    assert len(res.truths) == ds.records["object"].nunique()


def test_tdh_spark_inference(benchmark, spark, problem):
    ds, anc = problem
    rec = spark.createDataFrame(ds.records)
    anc_df = spark.createDataFrame(anc)

    def run():
        return TDHSpark(spark, max_iter=10).fit(rec, None, anc_df)

    res = benchmark.pedantic(run, rounds=1, iterations=1)
    assert len(res.truths) == ds.records["object"].nunique()


def test_vote_spark(benchmark, spark, problem):
    ds, _ = problem
    rec = spark.createDataFrame(ds.records).persist()
    rec.count()

    def run():
        return vote_spark(rec).toPandas()

    out = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(out) > 0
    rec.unpersist()
