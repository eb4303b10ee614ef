"""Evaluation metrics (§4.1), computed as Spark joins.

- blocker recall: |CAND ∩ DUPS| / |DUPS|
- all-pairs P/R/F1: predicted dups = {(r,s) ∈ CAND : P(dup) > 0.5}
  against the gold DUPS list
- test P/R/F1: same predictions restricted to the labeled test pairs
  (a pair not retrieved in CAND is predicted non-dup)

Each has a DuckDB-oracle test in ``tests/test_evaluate.py``.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

_PAIR = ["rid_r", "rid_s"]


def _prf(tp: int, n_pred: int, n_gold: int) -> dict:
    p = tp / n_pred if n_pred else 0.0
    r = tp / n_gold if n_gold else 0.0
    f1 = 2 * p * r / (p + r) if p + r else 0.0
    return {"precision": 100 * p, "recall": 100 * r, "f1": 100 * f1}


def blocker_recall(cand: DataFrame, dups: DataFrame) -> float:
    """Fraction of gold duplicates present in the candidate set."""
    n_gold = dups.count()
    if n_gold == 0:
        return 0.0
    hit = dups.join(cand.select(_PAIR), on=_PAIR, how="inner").count()
    return 100.0 * hit / n_gold


def all_pairs_prf(scored_cand: DataFrame, dups: DataFrame, threshold: float = 0.5) -> dict:
    """P/R/F1 of {cand pairs with prob>threshold} vs the gold DUPS."""
    pred = scored_cand.filter(F.col("prob") > threshold).select(_PAIR)
    n_pred = pred.count()
    n_gold = dups.count()
    tp = pred.join(dups.select(_PAIR), on=_PAIR, how="inner").count()
    return _prf(tp, n_pred, n_gold)


def test_prf(
    test: DataFrame, cand: DataFrame, scored_test: DataFrame, threshold: float = 0.5
) -> dict:
    """P/R/F1 on the labeled test pairs.

    A test pair is predicted duplicate iff it is in CAND *and* its
    matcher probability exceeds the threshold (§4.1: "the overall system
    predicts a record pair to be a duplicate only if the record pair is
    retrieved in CAND and the matcher assigns probability > 0.5").
    """
    in_cand = test.join(
        cand.select(_PAIR).withColumn("_in_cand", F.lit(1)), on=_PAIR, how="left"
    )
    with_prob = in_cand.join(scored_test, on=_PAIR, how="left")
    pred = with_prob.withColumn(
        "pred",
        (
            F.col("_in_cand").isNotNull()
            & (F.coalesce(F.col("prob"), F.lit(0.0)) > threshold)
        ).cast("int"),
    )
    agg = pred.agg(
        F.sum((F.col("pred") * F.col("label"))).alias("tp"),
        F.sum("pred").alias("n_pred"),
        F.sum("label").alias("n_gold"),
    ).collect()[0]
    return _prf(int(agg.tp or 0), int(agg.n_pred or 0), int(agg.n_gold or 0))
