"""JedAI-style end-to-end ER pipelines (§4.3), non-learning baselines.

- **schema-based**: similarity join on the key attribute (title token
  Jaccard >= t) → predicted duplicates. Mirrors JedAI's schema-based
  workflow built on similarity joins.
- **schema-agnostic**: token blocking over ALL attribute values →
  meta-blocking (ARCS weights + weighted node pruning) → Jaccard
  verification threshold → predicted duplicates.

As in the paper, each workflow's configuration (the thresholds) is
grid-searched against the gold duplicate list and the best-F1 config is
reported.
"""
from __future__ import annotations

import time

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.evaluate import _prf
from repro.simjoin.metablock import blocking_graph, weighted_node_pruning
from repro.simjoin.tokens import jaccard_pairs

_PAIR = ["rid_r", "rid_s"]


def _eval_pred(pred: DataFrame, dups: DataFrame) -> dict:
    n_pred = pred.count()
    n_gold = dups.count()
    tp = pred.select(_PAIR).join(dups.select(_PAIR), _PAIR, "inner").count()
    return _prf(tp, n_pred, n_gold)


def schema_based(
    spark: SparkSession, ds, thresholds=(0.3, 0.4, 0.5, 0.6, 0.7)
) -> dict:
    """Similarity-join workflow; returns best-config metrics + RT."""
    t0 = time.perf_counter()
    scored = jaccard_pairs(ds.R, ds.S, "title").cache()
    scored.count()
    best = None
    for t in thresholds:
        m = _eval_pred(scored.filter(F.col("jaccard") >= t), ds.dups)
        if best is None or m["f1"] > best["f1"]:
            best = {**m, "threshold": t}
    scored.unpersist()
    best["rt_seconds"] = time.perf_counter() - t0
    return best


def schema_agnostic(
    spark: SparkSession, ds, thresholds=(0.2, 0.3, 0.4, 0.5, 0.6)
) -> dict:
    """Token blocking + meta-blocking + verification; best-config metrics."""
    t0 = time.perf_counter()
    graph = weighted_node_pruning(blocking_graph(ds.R, ds.S, "text", "arcs"))
    verified = (
        graph.join(jaccard_pairs(ds.R, ds.S, "text"), _PAIR, "inner").cache()
    )
    verified.count()
    best = None
    for t in thresholds:
        m = _eval_pred(verified.filter(F.col("jaccard") >= t), ds.dups)
        if best is None or m["f1"] > best["f1"]:
            best = {**m, "threshold": t}
    verified.unpersist()
    best["rt_seconds"] = time.perf_counter() - t0
    return best
