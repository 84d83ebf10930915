"""Noise operators used by the dataset generators.

Two noise families drive the paper's findings (§8): *character-level*
errors dominate curated structured data (keeping typo'd tokens adjacent
in alphabetical order, which favours similarity-based methods), while
*token-level* noise — dropped/reordered/replaced tokens and URI values —
dominates semi-structured data (favouring equality-based methods).

Typos avoid the first character by default so the corrupted token still
sorts next to its original — the property character-level noise has in
real curated datasets.
"""
from __future__ import annotations

import numpy as np

_ALPHABET = "abcdefghijklmnopqrstuvwxyz"


def typo(g: np.random.Generator, s: str, *, keep_head: bool = True) -> str:
    """One random edit (swap/delete/replace/insert) at a non-leading position."""
    if len(s) < 3:
        return s
    lo = 1 if keep_head else 0
    pos = int(g.integers(lo, len(s)))
    op = int(g.integers(0, 4))
    ch = _ALPHABET[int(g.integers(0, 26))]
    if op == 0 and pos < len(s) - 1:  # swap
        return s[:pos] + s[pos + 1] + s[pos] + s[pos + 2 :]
    if op == 1:  # delete
        return s[:pos] + s[pos + 1 :]
    if op == 2:  # replace
        return s[:pos] + ch + s[pos + 1 :]
    return s[:pos] + ch + s[pos:]  # insert


_VOWELS = "aeiou"


def vowel_typo(g: np.random.Generator, s: str) -> str:
    """Replace one non-leading vowel with a different vowel.

    Soundex ignores vowels, so this is the character-level noise that
    breaks exact token equality while leaving both the Soundex blocking
    key and (mostly) the alphabetical neighbourhood intact — the census
    regime where schema-based PSN beats equality-based methods (§7.1).
    """
    positions = [k for k, c in enumerate(s) if c in _VOWELS and k > 0]
    if not positions:
        return s
    # Prefer late vowels: a long shared prefix keeps the corrupted token
    # alphabetically adjacent to the original (similarity evidence), while
    # exact equality is broken either way.
    pos = positions[-1] if g.random() < 0.7 else positions[int(g.integers(0, len(positions)))]
    repl = _VOWELS[int(g.integers(0, 5))]
    while repl == s[pos]:
        repl = _VOWELS[int(g.integers(0, 5))]
    return s[:pos] + repl + s[pos + 1 :]


def corrupt_phrase(
    g: np.random.Generator,
    s: str,
    *,
    p_typo: float = 0.0,
    p_drop: float = 0.0,
) -> str:
    """Apply per-token char-level typos and token drops to a phrase."""
    out = []
    for tok in s.split():
        if g.random() < p_drop:
            continue
        out.append(typo(g, tok) if g.random() < p_typo else tok)
    if not out:  # never emit an empty value
        out = [s.split()[0]]
    return " ".join(out)


def digits(g: np.random.Generator, n: int) -> str:
    return "".join(str(int(d)) for d in g.integers(0, 10, n))


def perturb_digits(g: np.random.Generator, s: str, p: float) -> str:
    """Flip each digit with probability ``p`` (zip codes, phone numbers)."""
    return "".join(
        str(int(g.integers(0, 10))) if c.isdigit() and g.random() < p else c for c in s
    )
