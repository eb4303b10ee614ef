"""Procedural vocabularies."""
import numpy as np
import pytest

from repro.data.vocab import Vocab, make_words, zipf_weights


def test_make_words_distinct_and_deterministic():
    w1 = make_words(100, seed=7)
    w2 = make_words(100, seed=7)
    assert w1 == w2
    assert len(set(w1)) == 100


def test_make_words_different_seeds_differ():
    assert make_words(50, seed=1) != make_words(50, seed=2)


def test_zipf_weights_normalized_decreasing():
    w = zipf_weights(100)
    np.testing.assert_allclose(w.sum(), 1.0)
    assert np.all(np.diff(w) < 0)


def test_vocab_pools_sized():
    v = Vocab(seed=0)
    assert len(v.brands) == 40
    assert len(v.noise_words) == 120
    content = set(v.categories) | set(v.descriptors) | set(v.title_words)
    assert len(v.synonyms) == len(content)  # pools may share a few words


def test_synonyms_map_to_fresh_words():
    v = Vocab(seed=0)
    originals = set(v.synonyms.keys())
    # synonym words are generated separately; collisions with the source
    # vocabulary should be essentially absent
    alts = list(v.synonyms.values())
    overlap = sum(a in originals for a in alts)
    assert overlap < 0.02 * len(alts)


def test_model_code_shape():
    v = Vocab(seed=0)
    rng = np.random.default_rng(0)
    for _ in range(50):
        code = v.model_code(rng)
        assert code[0].isalpha() and code[-1].isdigit()
        assert 3 <= len(code) <= 8


def test_brand_sampling_is_zipfian():
    v = Vocab(seed=0)
    rng = np.random.default_rng(0)
    counts = {}
    for _ in range(2000):
        b = v.sample_brand(rng)
        counts[b] = counts.get(b, 0) + 1
    top = max(counts.values())
    assert top > 2000 / 40 * 2  # head brand well above uniform


def test_author_format():
    v = Vocab(seed=0)
    rng = np.random.default_rng(0)
    a = v.author(rng)
    first, last = a.split()
    assert first in v.first_names and last in v.last_names


def test_sample_descriptors_unique():
    v = Vocab(seed=0)
    rng = np.random.default_rng(0)
    d = v.sample_descriptors(rng, 10)
    assert len(set(d)) == 10
