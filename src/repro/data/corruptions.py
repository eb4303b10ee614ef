"""Corruption model: how list S's rendering of an entity diverges from
list R's (the "heterogeneous representations" of the title).

Each dataset spec carries a ``Dirt`` level controlling per-token typo
probability, token-drop probability, abbreviation probability, and the
probability that the high-signal token (model code / brand) itself is
damaged — the latter is what makes hand-crafted Rules blocking miss
duplicates, as the paper observes on Walmart-Amazon and Abt-Buy.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class Dirt:
    typo_p: float
    drop_p: float
    abbrev_p: float
    key_damage_p: float  # chance the model-code/brand token is corrupted
    swap_p: float = 0.05  # light token reordering
    # catalog heterogeneity: S-side renders carry `noise_lo..noise_hi`
    # boilerplate tokens (seller blurbs, shipping terms, ...) and, when
    # `shuffle`, arbitrary token order — this is what makes the two
    # lists' *single-mode embeddings* genuinely heterogeneous, so a
    # frozen pretrained index does not trivially solve blocking
    noise_lo: int = 0
    noise_hi: int = 0
    shuffle: bool = False
    # catalog-specific wording: each content token is replaced by the S
    # catalog's synonym for it with prob syn_p. Synonyms share no
    # characters with the original, so no amount of string/subword
    # similarity recovers them — only a *learned* alignment can (the
    # "heterogeneous entity representations" of the paper's title; the
    # multilingual dataset is the 100%-synonym extreme of this knob).
    syn_p: float = 0.0


LOW = Dirt(typo_p=0.02, drop_p=0.02, abbrev_p=0.01, key_damage_p=0.005,
           noise_lo=0, noise_hi=2, syn_p=0.03)
MEDIUM = Dirt(typo_p=0.08, drop_p=0.25, abbrev_p=0.06, key_damage_p=0.08,
              noise_lo=5, noise_hi=12, shuffle=True, syn_p=0.3)
HIGH = Dirt(typo_p=0.13, drop_p=0.30, abbrev_p=0.10, key_damage_p=0.15,
            swap_p=0.12, noise_lo=8, noise_hi=16, shuffle=True, syn_p=0.4)
# Scholar-style records are dirty but their *titles* stay mostly intact
# (the real DBLP-Scholar is solved at ~97 F1 by everything, Table 2) —
# the dirtiness lives in authors/venue formatting and added boilerplate.
SCHOLAR = Dirt(typo_p=0.08, drop_p=0.15, abbrev_p=0.08, key_damage_p=0.10,
               swap_p=0.10, noise_lo=4, noise_hi=10, shuffle=True, syn_p=0.15)


def typo(word: str, rng: np.random.Generator) -> str:
    """One character-level error: swap, replace, or delete."""
    if len(word) < 2:
        return word
    i = int(rng.integers(len(word) - 1))
    op = rng.integers(3)
    if op == 0:  # adjacent swap
        return word[:i] + word[i + 1] + word[i] + word[i + 2 :]
    if op == 1:  # replace
        c = chr(ord("a") + rng.integers(26))
        return word[:i] + c + word[i + 1 :]
    return word[:i] + word[i + 1 :]  # delete


def abbreviate(word: str, rng: np.random.Generator) -> str:
    """Truncate to a 3-4 char prefix, like catalog abbreviations."""
    if len(word) <= 4:
        return word
    return word[: int(rng.integers(3, 5))]


def corrupt_tokens(
    tokens: list[str],
    dirt: Dirt,
    rng: np.random.Generator,
    protected: set[int] = frozenset(),
    synonyms: dict[str, str] | None = None,
) -> list[str]:
    """Apply the dirt model to a token list.

    ``protected`` indexes are the high-signal tokens: they are only
    damaged with ``key_damage_p`` (and never dropped outright unless
    damaged), so most duplicates stay findable by Rules but a dirt-
    dependent fraction is not.
    """
    out: list[str] = []
    for i, t in enumerate(tokens):
        if i in protected:
            if rng.random() < dirt.key_damage_p:
                # damaged key: typo'd or dropped entirely
                if rng.random() < 0.5:
                    out.append(typo(t, rng))
                # else dropped
            else:
                out.append(t)
            continue
        if rng.random() < dirt.drop_p:
            continue
        if synonyms and t in synonyms and rng.random() < dirt.syn_p:
            out.append(synonyms[t])
            continue
        if rng.random() < dirt.abbrev_p:
            t = abbreviate(t, rng)
        elif rng.random() < dirt.typo_p:
            t = typo(t, rng)
        out.append(t)
    # light reordering: swap two adjacent non-protected tokens
    if len(out) >= 3 and rng.random() < dirt.swap_p:
        j = int(rng.integers(len(out) - 1))
        out[j], out[j + 1] = out[j + 1], out[j]
    return out


def add_catalog_noise(
    tokens: list[str], dirt: Dirt, noise_pool: list[str], rng: np.random.Generator
) -> list[str]:
    """Append boilerplate tokens and (optionally) shuffle the order —
    the S-side catalog's own rendering conventions."""
    out = list(tokens)
    if dirt.noise_hi > 0 and noise_pool:
        n = int(rng.integers(dirt.noise_lo, dirt.noise_hi + 1))
        out += [noise_pool[int(rng.integers(len(noise_pool)))] for _ in range(n)]
    if dirt.shuffle and len(out) > 1:
        rng.shuffle(out)
    return out
