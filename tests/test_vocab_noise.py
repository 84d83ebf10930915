"""Unit tests for the vocabulary and noise substrates of the generators."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.data.noise import (
    corrupt_phrase,
    digits,
    perturb_digits,
    typo,
    vowel_typo,
)
from repro.data.vocab import ZipfVocab, phrase, rng, vocabulary


def test_vocabulary_unique_and_deterministic():
    a = vocabulary(7, 500)
    b = vocabulary(7, 500)
    assert a == b
    assert len(set(a)) == 500


def test_vocabulary_seed_matters():
    assert vocabulary(1, 100) != vocabulary(2, 100)


def test_phrase_word_count():
    g = rng(0)
    assert len(phrase(g, vocabulary(0, 50), 4).split()) == 4


def test_zipf_vocab_is_skewed():
    zv = ZipfVocab(vocabulary(3, 2000), alpha=1.1)
    g = rng(42)
    draws = [zv.word(g) for _ in range(4000)]
    counts = {}
    for w in draws:
        counts[w] = counts.get(w, 0) + 1
    top = max(counts.values())
    # zipf head is far more frequent than the uniform expectation (~2)
    assert top > 20
    # and a long tail of words drawn exactly once exists
    assert sum(1 for c in counts.values() if c == 1) > 200


def test_zipf_phrase_deterministic():
    zv = ZipfVocab(vocabulary(3, 100))
    assert zv.phrase(rng(5), 3) == zv.phrase(rng(5), 3)


@given(st.text(alphabet="abcdefgh", min_size=3, max_size=10))
@settings(deadline=None, max_examples=40)
def test_typo_keeps_head(s):
    out = typo(rng(0), s)
    assert out[0] == s[0]
    assert abs(len(out) - len(s)) <= 1


def test_typo_short_strings_unchanged():
    assert typo(rng(0), "ab") == "ab"


def test_vowel_typo_changes_exactly_one_vowel():
    g = rng(1)
    s = "bakero"
    out = vowel_typo(g, s)
    assert out != s and len(out) == len(s)
    diffs = [(a, b) for a, b in zip(s, out) if a != b]
    assert len(diffs) == 1
    old, new = diffs[0]
    assert old in "aeiou" and new in "aeiou"


def test_vowel_typo_soundex_invariant(spark):
    from pyspark.sql import functions as F

    g = rng(2)
    words = [vocabulary(9, 50)[k] for k in range(50)]
    pairs = [(w, vowel_typo(g, w)) for w in words]
    df = spark.createDataFrame(pairs, "a string, b string")
    same = df.where(F.soundex("a") == F.soundex("b")).count()
    assert same == len(pairs)  # Soundex ignores vowels


def test_vowel_typo_no_vowels_noop():
    assert vowel_typo(rng(0), "xxzz") == "xxzz"


def test_corrupt_phrase_never_empty():
    g = rng(3)
    for _ in range(50):
        out = corrupt_phrase(g, "solo", p_typo=1.0, p_drop=1.0)
        assert out


def test_corrupt_phrase_drop_reduces_tokens():
    g = rng(4)
    out = corrupt_phrase(g, " ".join(["w%d" % k for k in range(100)]), p_drop=0.5)
    assert 20 < len(out.split()) < 80


def test_digits_length_and_charset():
    s = digits(rng(5), 8)
    assert len(s) == 8 and s.isdigit()


def test_perturb_digits_probability_extremes():
    g = rng(6)
    assert perturb_digits(g, "12345", 0.0) == "12345"
    out = perturb_digits(g, "1" * 200, 1.0)
    assert out != "1" * 200 and len(out) == 200


def test_perturb_digits_leaves_non_digits():
    assert perturb_digits(rng(7), "ab-cd", 1.0) == "ab-cd"
