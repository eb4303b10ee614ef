"""Index-By-Committee retrieval (Algorithm 1, lines 9-25).

For each committee member: index the member embeddings of all r in R,
probe with every s in S for its k nearest neighbours (distributed exact
k-NN, ``repro.index.brute``). The union of retrieved pairs RP is
deduplicated keeping the minimum distance, and the closest |CAND| pairs
form the candidate set — all as Spark DataFrame operations.

The same routine serves the single-embedding baselines (PairedFixed,
PairedAdapt, SentenceBERT) with a one-member "committee".
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.index.brute import knn_join


def l2_normalize(m: np.ndarray) -> np.ndarray:
    """Row-normalize so L2 k-NN is cosine retrieval (used for every
    blocking method so comparisons isolate the *embeddings*, not the
    metric)."""
    return m / np.maximum(np.linalg.norm(m, axis=1, keepdims=True), 1e-12)


def retrieve_cand(
    spark: SparkSession,
    r_rids: list[str],
    s_rids: list[str],
    r_embs_by_member: list[np.ndarray],
    s_embs_by_member: list[np.ndarray],
    k: int,
    cand_size: int,
) -> DataFrame:
    """→ DataFrame(rid_r, rid_s, dist): the |CAND| closest retrieved pairs.

    ``*_embs_by_member[m]`` is the (n, d) member-m embedding matrix in
    rid order. S records are the queries, R is indexed — matching the
    paper's "create index on R, probe with each s in S".
    """
    assert len(r_embs_by_member) == len(s_embs_by_member) >= 1
    rp: DataFrame | None = None
    for r_emb, s_emb in zip(r_embs_by_member, s_embs_by_member):
        knn = knn_join(spark, np.array(s_rids), s_emb, np.array(r_rids), r_emb, k)
        # rank the member's retrieved pairs by its own distances so the
        # merge across members is scale-free: each member's best pairs
        # get an equal claim on the candidate budget ("closest pairs
        # from RP", robust to members with different distance scales)
        ranked = knn.withColumn(
            "rank", F.row_number().over(Window.orderBy(F.col("dist").asc(), "qid", "iid"))
        )
        rp = ranked if rp is None else rp.unionByName(ranked)
    cand = (
        rp.groupBy("qid", "iid")
        .agg(F.min("rank").alias("rank"), F.min("dist").alias("dist"))
        .orderBy(F.col("rank").asc(), F.col("dist").asc(), F.col("qid").asc(), F.col("iid").asc())
        .limit(int(cand_size))
        .select(
            F.col("iid").alias("rid_r"), F.col("qid").alias("rid_s"), F.col("dist")
        )
    )
    return cand


def cand_size_for(ds_name: str, n_s: int, size: str = "default") -> int:
    """The paper's candidate-set sizing rules (§4.2, Table 6).

    Abt-Buy's S list is tiny so it uses 20·|S| by default (k=20); other
    datasets use 3·|S| (k=3). Table 6's sweep: small = 3·|DUPS| (handled
    by the caller, needs |DUPS|), medium = 3·|S| (10·|S| for Abt-Buy),
    large = 5·|S| (20·|S| for Abt-Buy).
    """
    abt = ds_name == "abt_buy"
    if size == "default":
        return (20 if abt else 3) * n_s
    if size == "medium":
        return (10 if abt else 3) * n_s
    if size == "large":
        return (20 if abt else 5) * n_s
    raise ValueError(size)


def knn_k_for(ds_name: str) -> int:
    return 20 if ds_name == "abt_buy" else 3
