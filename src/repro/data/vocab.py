"""Deterministic pseudo-word vocabularies for the dataset generators.

No word lists ship with the container, so vocabularies are synthesised
from syllables with a seeded RNG — stable across runs, realistic enough
to give tokens the length/prefix distribution the methods care about.
"""
from __future__ import annotations

import numpy as np

_SYLLABLES = [
    "ba", "ker", "lin", "mor", "ton", "vel", "ran", "shi", "lo", "pa",
    "den", "gar", "nor", "wes", "hal", "ford", "son", "man", "berg", "ley",
    "dale", "wick", "stone", "brid", "field", "ter", "mi", "ros", "cal", "dur",
    "fen", "gil", "har", "jan", "kel", "lam", "nev", "ost", "pren", "quil",
    "rud", "sal", "tam", "ulm", "vor", "wal", "xen", "yar", "zel", "cor",
]


def rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def word(g: np.random.Generator, min_syl: int = 2, max_syl: int = 4) -> str:
    n = int(g.integers(min_syl, max_syl + 1))
    return "".join(g.choice(_SYLLABLES) for _ in range(n))


def vocabulary(seed: int, n: int, *, min_syl: int = 2, max_syl: int = 4) -> list[str]:
    """``n`` distinct pseudo-words, deterministic in ``seed``."""
    g = rng(seed)
    seen: dict[str, None] = {}
    while len(seen) < n:
        seen.setdefault(word(g, min_syl, max_syl), None)
    return list(seen)


def phrase(g: np.random.Generator, vocab: list[str], n_words: int) -> str:
    idx = g.integers(0, len(vocab), n_words)
    return " ".join(vocab[int(i)] for i in idx)


class ZipfVocab:
    """Vocabulary with zipfian word frequencies.

    Real text has a long tail of rare words; rare tokens shared by a
    duplicate pair form the small, distinctive blocks that Block
    Scheduling (PBS) and alphabetical adjacency (LS-PSN) depend on.
    Uniform sampling has no such tail, so every generator drawing natural
    text uses this sampler. Draws are O(log |V|) via the cumulative table.
    """

    def __init__(self, words: list[str], alpha: float = 1.05):
        self.words = words
        w = 1.0 / np.arange(1, len(words) + 1, dtype=np.float64) ** alpha
        self.cum = np.cumsum(w / w.sum())

    def word(self, g: np.random.Generator) -> str:
        return self.words[int(np.searchsorted(self.cum, g.random()))]

    def phrase(self, g: np.random.Generator, n_words: int) -> str:
        return " ".join(self.word(g) for _ in range(n_words))
