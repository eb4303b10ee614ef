"""Corruption model (the S-catalog's rendering divergence)."""
import numpy as np
import pytest

from repro.data.corruptions import (
    HIGH,
    LOW,
    MEDIUM,
    Dirt,
    abbreviate,
    add_catalog_noise,
    corrupt_tokens,
    typo,
)


def test_typo_changes_word():
    rng = np.random.default_rng(0)
    changed = sum(typo("panasonic", rng) != "panasonic" for _ in range(50))
    assert changed >= 45  # swap can no-op on equal adjacent chars only


def test_typo_short_word_unchanged():
    rng = np.random.default_rng(0)
    assert typo("a", rng) == "a"


def test_typo_length_bounds():
    rng = np.random.default_rng(1)
    for _ in range(100):
        out = typo("keyboard", rng)
        assert len(out) in (7, 8)


def test_abbreviate():
    rng = np.random.default_rng(0)
    for _ in range(20):
        out = abbreviate("panasonic", rng)
        assert out in ("pan", "pana")
        assert "panasonic".startswith(out)
    assert abbreviate("abc", rng) == "abc"


def test_corrupt_tokens_no_dirt_noop():
    clean = Dirt(0, 0, 0, 0, swap_p=0)
    toks = ["alpha", "beta", "gamma"]
    rng = np.random.default_rng(0)
    assert corrupt_tokens(toks, clean, rng) == toks


def test_corrupt_tokens_drop_rate():
    d = Dirt(typo_p=0, drop_p=0.5, abbrev_p=0, key_damage_p=0, swap_p=0)
    rng = np.random.default_rng(0)
    kept = sum(len(corrupt_tokens(["w"] * 10, d, rng)) for _ in range(200))
    assert 800 < kept < 1200  # ~50% of 2000


def test_protected_tokens_survive_drop():
    d = Dirt(typo_p=0, drop_p=1.0, abbrev_p=0, key_damage_p=0.0, swap_p=0)
    rng = np.random.default_rng(0)
    out = corrupt_tokens(["keepme", "dropme"], d, rng, protected={0})
    assert out == ["keepme"]


def test_synonym_substitution():
    d = Dirt(typo_p=0, drop_p=0, abbrev_p=0, key_damage_p=0, swap_p=0, syn_p=1.0)
    rng = np.random.default_rng(0)
    out = corrupt_tokens(["alpha", "beta"], d, rng, synonyms={"alpha": "zulu"})
    assert out == ["zulu", "beta"]


def test_add_catalog_noise_counts():
    d = Dirt(0, 0, 0, 0, swap_p=0, noise_lo=2, noise_hi=4, shuffle=False)
    rng = np.random.default_rng(0)
    out = add_catalog_noise(["a", "b"], d, ["n1", "n2"], rng)
    assert out[:2] == ["a", "b"]
    assert 2 <= len(out) - 2 <= 4
    assert set(out[2:]) <= {"n1", "n2"}


def test_add_catalog_noise_shuffle_preserves_multiset():
    d = Dirt(0, 0, 0, 0, swap_p=0, noise_lo=0, noise_hi=0, shuffle=True)
    rng = np.random.default_rng(0)
    toks = [f"t{i}" for i in range(10)]
    out = add_catalog_noise(list(toks), d, [], rng)
    assert sorted(out) == sorted(toks)


@pytest.mark.parametrize("dirt", [LOW, MEDIUM, HIGH], ids=["low", "med", "high"])
def test_dirt_levels_ordering(dirt):
    assert 0 <= dirt.typo_p <= 1 and 0 <= dirt.drop_p <= 1


def test_dirt_monotone():
    assert LOW.drop_p < MEDIUM.drop_p < HIGH.drop_p
    assert LOW.key_damage_p < MEDIUM.key_damage_p < HIGH.key_damage_p
    assert LOW.noise_hi < MEDIUM.noise_hi <= HIGH.noise_hi


def test_corruption_determinism():
    d = MEDIUM
    out1 = corrupt_tokens(["a", "b", "c", "d"], d, np.random.default_rng(42))
    out2 = corrupt_tokens(["a", "b", "c", "d"], d, np.random.default_rng(42))
    assert out1 == out2
