"""VOTE — majority voting baseline.

Selects the value with the highest frequency among the claimed values
(sources plus any worker answers), ignoring the hierarchy. Confidence is
the vote share, so uncertainty-based task assigners can consume it.

A Spark implementation is provided for oracle-checked distributed
counting; the pandas one is used inside the crowdsourcing round loop.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.result import InferenceResult, argmax_truths


def _all_claims(records: pd.DataFrame, answers: pd.DataFrame | None) -> pd.DataFrame:
    claims = records[["object", "value"]]
    if answers is not None and len(answers):
        claims = pd.concat([claims, answers[["object", "value"]]], ignore_index=True)
    return claims


def vote(records: pd.DataFrame, answers: pd.DataFrame | None = None) -> InferenceResult:
    """Majority vote; confidences are normalized vote shares."""
    claims = _all_claims(records, answers)
    counts = claims.groupby(["object", "value"]).size().rename("n").reset_index()
    counts["mu"] = counts["n"] / counts.groupby("object")["n"].transform("sum")
    mu = counts[["object", "value", "mu"]].sort_values(["object", "value"]).reset_index(
        drop=True
    )
    return InferenceResult(truths=argmax_truths(mu), mu=mu)


def vote_spark(records: DataFrame, answers: DataFrame | None = None) -> DataFrame:
    """Distributed majority vote: returns (object, value, n, mu).

    The winning row per object is the one with max ``mu`` (ties broken by
    smallest value, matching :func:`repro.core.result.argmax_truths`).
    """
    claims = records.select("object", "value")
    if answers is not None:
        claims = claims.unionByName(answers.select("object", "value"))
    counts = claims.groupBy("object", "value").agg(F.count("*").alias("n"))
    totals = counts.groupBy("object").agg(F.sum("n").alias("total"))
    return (
        counts.join(totals, "object")
        .withColumn("mu", F.col("n") / F.col("total"))
        .select("object", "value", "n", "mu")
    )
