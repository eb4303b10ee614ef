"""Multilingual EN-"DE" dataset (§4.5 substrate)."""
import numpy as np
import pytest

from repro.data.multilingual import make_multilingual
from repro.text.tokenize import tokenize


@pytest.fixture(scope="module")
def mlds(spark):
    return make_multilingual(spark, scale=0.004, seed=0)


def test_parallel_alignment(mlds):
    n = len(mlds.r_pdf)
    assert len(mlds.s_pdf) == n
    assert len(mlds.dups_pdf) == n  # |DUPS| = |R| = |S|


def test_dups_are_identity_alignment(mlds):
    for i, (r, s) in enumerate(zip(mlds.dups_pdf.rid_r, mlds.dups_pdf.rid_s)):
        assert r == f"r{i}" and s == f"s{i}"


def test_cipher_partial_overlap(mlds):
    """~shared_frac of token mass passes through (numbers, names);
    the rest is ciphered into disjoint pseudo-German words."""
    r_text = dict(zip(mlds.r_pdf.rid, mlds.r_pdf.title))
    s_text = dict(zip(mlds.s_pdf.rid, mlds.s_pdf.title))
    overlaps = []
    for r, s in zip(mlds.dups_pdf.rid_r, mlds.dups_pdf.rid_s):
        tr, ts = set(tokenize(r_text[r])), set(tokenize(s_text[s]))
        if tr:
            overlaps.append(len(tr & ts) / len(tr))
    mean = np.mean(overlaps)
    assert 0.2 < mean < 0.75  # partial but far from total overlap


def test_translation_deterministic_per_word(spark):
    a = make_multilingual(spark, scale=0.004, seed=0)
    b = make_multilingual(spark, scale=0.004, seed=0)
    assert a.s_pdf.text.tolist() == b.s_pdf.text.tolist()


def test_tags_present_sometimes(mlds):
    tagged = mlds.r_pdf.text.str.contains("<").sum()
    assert 0 < tagged < len(mlds.r_pdf)


def test_tags_aligned_across_languages(mlds):
    s_by_rid = dict(zip(mlds.s_pdf.rid, mlds.s_pdf.text))
    for i, (rtext) in enumerate(mlds.r_pdf.text):
        stext = s_by_rid[f"s{i}"]
        assert rtext.startswith("<") == stext.startswith("<")


def test_seed_pool_only_positives_initially(mlds):
    # the §4.5 probe-based seed/test prep happens in the Runner, not here
    assert len(mlds.seed_neg_pdf) == 0
    assert len(mlds.seed_pos_pdf) > 0


def test_runner_prepares_ml_splits(runner):
    ds = runner.dataset("multilingual")
    assert len(ds.seed_neg_pdf) > 0  # probe-based negatives were added
    assert set(ds.test_pdf.label.unique()) == {0, 1}
    dup_set = ds.dup_set
    for row in ds.test_pdf.itertuples():
        assert row.label == int((row.rid_r, row.rid_s) in dup_set)
