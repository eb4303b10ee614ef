"""The DIAL matcher: paired-mode classifier (Eq 5, trained with Eq 6).

Architecture (the TPLM-substitute version of §3.1):

- backbone ``A`` (d x d, initialized to identity): the trainable part of
  the "transformer parameters Θ". ``E_adapt(x) = E(x) @ A`` is the
  matcher-fine-tuned single-mode embedding used by PairedAdapt and as
  the (frozen) input to DIAL's blocker committee.
- paired features ``[ |h_r-h_s| , h_r⊙h_s , alignment(4) ]`` where
  ``h = E_adapt``; the 4 token-alignment stats are the cross-attention
  stand-in (see ``repro.text.features.alignment_features``).
- head ``F_W``: linear → tanh → linear → scalar logit (exactly the
  paper's classification head shape), sigmoid → P(dup) (Eq 5).

Training runs on the driver (T is a few hundred pairs); *scoring* of the
candidate set runs distributed in ``score_pairs`` (mapInPandas with the
parameters broadcast).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.linalg.autograd import Tensor, const, param
from repro.linalg.losses import bce_with_logits, class_balance_weights
from repro.linalg.optim import AdamW
from repro.text.features import HashedLM, N_ALIGN_FEATURES, alignment_features_batch

N_ALIGN = N_ALIGN_FEATURES


class Matcher:
    """Paired-mode matcher with trainable backbone + MLP head."""

    def __init__(self, d: int, hidden: int = 64, seed: int = 0):
        rng = np.random.default_rng(seed)
        self.d = d
        self.hidden = hidden
        n_feat = 2 * d + N_ALIGN
        # identity init: before any training, adapted embeddings ~= base
        # (noise scaled 1/sqrt(d) so the perturbation stays ~1% of ||E||)
        self.A = param(np.eye(d) + (0.1 / np.sqrt(d)) * rng.standard_normal((d, d)))
        self.W1 = param(rng.standard_normal((n_feat, hidden)) * np.sqrt(2.0 / n_feat))
        self.b1 = param(np.zeros(hidden))
        self.W2 = param(rng.standard_normal((hidden, 1)) * np.sqrt(2.0 / hidden))
        self.b2 = param(np.zeros(1))

    # -- forward -----------------------------------------------------------
    def _features(self, er: Tensor, es: Tensor, align: Tensor) -> Tensor:
        hr = er @ self.A
        hs = es @ self.A
        return Tensor.concat([(hr - hs).abs(), hr * hs, align], axis=1)

    def forward(self, er: np.ndarray, es: np.ndarray, align: np.ndarray) -> Tensor:
        f = self._features(const(er), const(es), const(align))
        z1 = (f @ self.W1 + self.b1).tanh()
        return (z1 @ self.W2 + self.b2).reshape(-1)

    # -- training (Eq 6) ---------------------------------------------------
    def fit(
        self,
        er: np.ndarray,
        es: np.ndarray,
        align: np.ndarray,
        labels: np.ndarray,
        *,
        epochs: int = 20,
        batch_size: int = 16,
        lr_backbone: float = 1e-4,
        lr_head: float = 3e-3,
        seed: int = 0,
    ) -> list[float]:
        """AdamW with per-group LRs and linear decay (§4.2). Returns the
        per-epoch mean loss trace (tests assert it decreases)."""
        n = len(labels)
        steps_per_epoch = max(1, (n + batch_size - 1) // batch_size)
        opt = AdamW(
            [([self.A], lr_backbone), ([self.W1, self.b1, self.W2, self.b2], lr_head)],
            total_steps=epochs * steps_per_epoch,
        )
        rng = np.random.default_rng(seed)
        weights = class_balance_weights(labels)
        trace = []
        for _ in range(epochs):
            order = rng.permutation(n)
            losses = []
            for b0 in range(0, n, batch_size):
                idx = order[b0 : b0 + batch_size]
                opt.zero_grad()
                logits = self.forward(er[idx], es[idx], align[idx])
                loss = bce_with_logits(logits, labels[idx], weights[idx])
                loss.backward()
                opt.step()
                losses.append(loss.item())
            trace.append(float(np.mean(losses)))
        return trace

    # -- inference (numpy only, broadcast-friendly) ------------------------
    def params(self) -> dict:
        return {
            "A": self.A.data.copy(),
            "W1": self.W1.data.copy(),
            "b1": self.b1.data.copy(),
            "W2": self.W2.data.copy(),
            "b2": self.b2.data.copy(),
            "d": self.d,
        }

    def transform(self, emb: np.ndarray) -> np.ndarray:
        """Matcher-adapted single-mode embeddings E(x) @ A (frozen view)."""
        return emb @ self.A.data

    def predict_proba(
        self, er: np.ndarray, es: np.ndarray, align: np.ndarray
    ) -> np.ndarray:
        return predict_from_params(self.params(), er, es, align)[0]


def predict_from_params(
    p: dict, er: np.ndarray, es: np.ndarray, align: np.ndarray
) -> tuple[np.ndarray, np.ndarray]:
    """Pure-numpy forward pass: returns (probs, hidden activations).

    The hidden activations are exposed for BADGE's output-layer gradient
    embeddings (§2.3.4).
    """
    hr = er @ p["A"]
    hs = es @ p["A"]
    f = np.concatenate([np.abs(hr - hs), hr * hs, align], axis=1)
    z1 = np.tanh(f @ p["W1"] + p["b1"])
    logit = (z1 @ p["W2"] + p["b2"]).ravel()
    return 1.0 / (1.0 + np.exp(-logit)), z1


_SCORE_SCHEMA = T.StructType(
    [
        T.StructField("rid_r", T.StringType()),
        T.StructField("rid_s", T.StringType()),
        T.StructField("prob", T.DoubleType()),
    ]
)


def score_pairs(
    spark: SparkSession,
    pairs: DataFrame,
    store,
    params_list: list[dict],
    out_cols: list[str] | None = None,
    average: bool = False,
) -> DataFrame:
    """Distributed paired-mode scoring of (rid_r, rid_s) pairs.

    ``params_list`` may hold several matchers (the QBC committee, or the
    variance-reduction ensemble): the result has one probability column
    per member — this is the committee-based scoring UDF over
    partitioned pair data. With ``average=True`` the member
    probabilities are averaged inside the UDF into a single ``prob``
    column. Embeddings, texts and all member parameters ride one
    broadcast.
    """
    if average:
        out_cols = ["prob"]
    else:
        out_cols = out_cols or (
            ["prob"] if len(params_list) == 1 else [f"prob_{i}" for i in range(len(params_list))]
        )
    schema = T.StructType(
        [T.StructField("rid_r", T.StringType()), T.StructField("rid_s", T.StringType())]
        + [T.StructField(c, T.DoubleType()) for c in out_cols]
    )
    sc = spark.sparkContext
    b = sc.broadcast(
        {
            "r_emb": store.r_emb,
            "s_emb": store.s_emb,
            "r_index": store.r_index,
            "s_index": store.s_index,
            "r_texts": store.r_texts,
            "s_texts": store.s_texts,
            "params": params_list,
            "d": store.d,
        }
    )

    def part(batches):
        state = b.value
        lm = HashedLM(state["d"])
        for pdf in batches:
            if len(pdf) == 0:
                continue
            er = state["r_emb"][[state["r_index"][r] for r in pdf.rid_r]]
            es = state["s_emb"][[state["s_index"][s] for s in pdf.rid_s]]
            align = alignment_features_batch(
                lm,
                [state["r_texts"][r] for r in pdf.rid_r],
                [state["s_texts"][s] for s in pdf.rid_s],
            )
            out = {"rid_r": pdf.rid_r.values, "rid_s": pdf.rid_s.values}
            if average:
                probs = [
                    predict_from_params(p, er, es, align)[0] for p in state["params"]
                ]
                out["prob"] = np.mean(probs, axis=0)
            else:
                for c, p in zip(out_cols, state["params"]):
                    out[c], _ = predict_from_params(p, er, es, align)
            yield pd.DataFrame(out)

    n_part = max(2, min(16, pairs.count() // 256 or 2))
    return pairs.select("rid_r", "rid_s").repartition(n_part).mapInPandas(part, schema=schema)


def pair_align_features(store, pairs: pd.DataFrame, lm: HashedLM | None = None) -> np.ndarray:
    """Driver-side alignment features for a small pair frame (training)."""
    lm = lm or HashedLM(store.d)
    tr, ts = store.pair_texts(pairs)
    return alignment_features_batch(lm, tr, ts)
