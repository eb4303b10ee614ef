"""Distributed single-mode encoding + EmbeddingStore."""
import numpy as np
import pytest

from repro.core.encoders import EmbeddingStore, encode_records
from repro.text.features import HashedLM


def test_encode_records_matches_driver_encoder(spark, wa, runner):
    d = runner.config("walmart_amazon").d
    got = encode_records(wa.R, d).toPandas()
    lm = HashedLM(d)
    lut = {rid: np.asarray(e) for rid, e in zip(got.rid, got.emb)}
    for row in wa.r_pdf.head(10).itertuples():
        np.testing.assert_allclose(lut[row.rid], lm.encode(row.text), atol=1e-12)


def test_encode_records_covers_all_rids(spark, wa, runner):
    d = runner.config("walmart_amazon").d
    got = encode_records(wa.S, d).toPandas()
    assert set(got.rid) == set(wa.s_pdf.rid)


def test_store_matrices_aligned(runner, wa, wa_store):
    assert wa_store.r_emb.shape == (len(wa.r_pdf), wa_store.d)
    assert wa_store.s_emb.shape == (len(wa.s_pdf), wa_store.d)
    lm = HashedLM(wa_store.d)
    i = 7 % len(wa.r_pdf)
    rid = wa_store.r_rids[i]
    np.testing.assert_allclose(
        wa_store.r_emb[i], lm.encode(wa_store.r_texts[rid]), atol=1e-12
    )


def test_store_pair_embs(runner, wa, wa_store):
    pairs = wa.dups_pdf.head(4)
    er, es = wa_store.pair_embs(pairs)
    assert er.shape == (4, wa_store.d) and es.shape == (4, wa_store.d)
    for j, (r, s) in enumerate(zip(pairs.rid_r, pairs.rid_s)):
        np.testing.assert_array_equal(er[j], wa_store.r_emb[wa_store.r_index[r]])
        np.testing.assert_array_equal(es[j], wa_store.s_emb[wa_store.s_index[s]])


def test_store_pair_texts(runner, wa, wa_store):
    pairs = wa.dups_pdf.head(3)
    tr, ts = wa_store.pair_texts(pairs)
    r_lut = dict(zip(wa.r_pdf.rid, wa.r_pdf.text))
    assert tr == [r_lut[r] for r in pairs.rid_r]
