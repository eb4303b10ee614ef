"""Evaluation metrics (§4.1) vs DuckDB oracles."""
import pandas as pd
import pytest

from repro.core.evaluate import _prf, all_pairs_prf, blocker_recall
from repro.core.evaluate import test_prf as tprf  # alias: bare name would be collected
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def frames(spark):
    dups = pd.DataFrame({"rid_r": ["r0", "r1", "r2", "r3"], "rid_s": ["s0", "s1", "s2", "s3"]})
    cand = pd.DataFrame(
        {
            "rid_r": ["r0", "r1", "r2", "r9", "r8"],
            "rid_s": ["s0", "s1", "s9", "s9", "s8"],
            "dist": [0.1] * 5,
        }
    )
    scored = cand.assign(prob=[0.9, 0.4, 0.8, 0.95, 0.2])
    test = pd.DataFrame(
        {
            "rid_r": ["r0", "r1", "r9", "r3"],
            "rid_s": ["s0", "s1", "s9", "s3"],
            "label": [1, 1, 0, 1],
        }
    )
    return {
        "dups": spark.createDataFrame(dups),
        "cand": spark.createDataFrame(cand),
        "scored": spark.createDataFrame(scored[["rid_r", "rid_s", "prob"]]),
        "test": spark.createDataFrame(test),
        "dups_pdf": dups,
        "scored_pdf": scored,
        "test_pdf": test,
    }


def test_prf_helper():
    m = _prf(tp=3, n_pred=4, n_gold=6)
    assert m["precision"] == 75.0
    assert m["recall"] == 50.0
    assert abs(m["f1"] - 60.0) < 1e-9


def test_prf_zero_safe():
    m = _prf(0, 0, 0)
    assert m == {"precision": 0.0, "recall": 0.0, "f1": 0.0}


def test_blocker_recall(frames):
    # cand contains r0-s0, r1-s1 of the 4 gold dups
    assert blocker_recall(frames["cand"], frames["dups"]) == 50.0


def test_all_pairs_prf(frames):
    m = all_pairs_prf(frames["scored"], frames["dups"])
    # predicted dups: prob>0.5 -> (r0,s0), (r2,s9), (r9,s9); tp = 1
    assert abs(m["precision"] - 100 / 3) < 1e-9
    assert m["recall"] == 25.0


def test_all_pairs_prf_oracle(frames):
    """Cross-check tp/n_pred/n_gold against DuckDB."""
    import pyspark.sql.functions as F

    got = frames["scored"].filter(F.col("prob") > 0.5).join(
        frames["dups"], ["rid_r", "rid_s"], "inner"
    ).select("rid_r", "rid_s")
    assert_equivalent(
        got,
        """
        SELECT s.rid_r, s.rid_s FROM scored s JOIN dups d
        ON s.rid_r = d.rid_r AND s.rid_s = d.rid_s
        WHERE s.prob > 0.5
        """,
        scored=frames["scored_pdf"][["rid_r", "rid_s", "prob"]],
        dups=frames["dups_pdf"],
    )


def test_test_prf(frames):
    m = tprf(frames["test"], frames["cand"], frames["scored"])
    # test pairs: (r0,s0) in cand prob .9 -> pred 1 (tp)
    #             (r1,s1) in cand prob .4 -> pred 0
    #             (r9,s9) in cand prob .95 -> pred 1 (fp)
    #             (r3,s3) not in cand -> pred 0 (fn)
    assert m["precision"] == 50.0
    assert abs(m["recall"] - 100 / 3) < 1e-9


def test_test_prf_pair_not_in_cand_is_negative(spark, frames):
    empty_cand = spark.createDataFrame(
        [], schema="rid_r string, rid_s string, dist double"
    )
    m = tprf(frames["test"], empty_cand, frames["scored"])
    assert m["recall"] == 0.0 and m["precision"] == 0.0


def test_blocker_recall_empty_gold(spark, frames):
    empty = spark.createDataFrame([], schema="rid_r string, rid_s string")
    assert blocker_recall(frames["cand"], empty) == 0.0


def test_labeler(frames):
    from repro.core.labeler import label_pairs

    pairs = pd.DataFrame({"rid_r": ["r0", "r9"], "rid_s": ["s0", "s9"]})
    out = label_pairs(pairs, {("r0", "s0")})
    assert out.label.tolist() == [1, 0]
