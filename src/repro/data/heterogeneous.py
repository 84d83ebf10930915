"""Synthetic analogues of the three large, heterogeneous Clean-clean
datasets (Table 2), parameterised by ``scale`` (fraction of the published
profile counts — the full 1M–4M collections exceed this container; the
scale used per experiment is recorded in EXPERIMENTS.md).

Noise recipes follow the paper's §7.2/§8 diagnosis:

* ``movies``  — mostly-textual records with character/token noise in the
  titles: both similarity- and equality-based evidence survive.
* ``dbpedia`` — two snapshots sharing only ~25% of their name-value pairs
  (paper fn. 2): entity facts are sampled independently per snapshot from
  a common pool, with token-level noise on names.
* ``freebase``— RDF-style profiles dominated by URIs: matching profiles
  share a handful of referent URIs *exactly* (equality evidence), but
  URI popularity is zipfian, so the Neighbor List is flooded with long
  equal-key runs and near-identical non-matching URIs — the alphabetical
  proximity signal the similarity-based methods depend on is destroyed.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from repro.common import CLEAN
from repro.data.base import Dataset, ProfileBuilder
from repro.data.noise import corrupt_phrase
from repro.data.vocab import phrase, rng, vocabulary

# Published source sizes and match counts (Table 2), multiplied by `scale`.
_MOVIES = (27_615, 23_182, 22_863)
_DBPEDIA = (1_190_733, 2_164_040, 892_579)
_FREEBASE = (4_157_429, 3_712_075, 1_497_546)

# Natural-language stop words: their blocks are removed by Block Purging
# (equality methods unaffected — the paper calls this out explicitly),
# but they flood the Neighbor List with huge equal-key runs whose
# coincidental co-occurrences the RCF scheme cannot discount — the reason
# PPS overtakes the similarity-based methods on large textual data.
_STOPWORDS = [
    "the", "of", "and", "in", "on", "at", "an", "for", "with", "from", "to", "by",
]


def _with_stopwords(g: np.random.Generator, text: str, p: float = 0.4) -> str:
    out = []
    for tok in text.split():
        if g.random() < p:
            out.append(_STOPWORDS[int(g.integers(0, len(_STOPWORDS)))])
        out.append(tok)
    return " ".join(out)


def _counts(published: tuple[int, int, int], scale: float) -> tuple[int, int, int]:
    n1, n2, d = (max(1, int(round(x * scale))) for x in published)
    return n1, n2, min(d, n1, n2)


def _zipf_choice(g: np.random.Generator, weights: np.ndarray, k: int) -> list[int]:
    """k distinct indices drawn with zipfian weights."""
    out: dict[int, None] = {}
    while len(out) < k:
        out.setdefault(int(g.choice(len(weights), p=weights)), None)
    return list(out)


def movies_like(spark: SparkSession, *, scale: float = 1.0, seed: int = 4) -> Dataset:
    """movies: imdb (4 attrs) vs dbpedia (7 attrs), 22.9k matches at scale 1."""
    g = rng(seed)
    n1, n2, n_match = _counts(_MOVIES, scale)
    title_words = vocabulary(seed + 10, 1500)
    persons = vocabulary(seed + 11, 3000)
    genres = vocabulary(seed + 12, 20)
    countries = vocabulary(seed + 13, 15)

    # Franchise/series pool: ~45% of movies belong to a series of ~7 that
    # share base-title words, director and genre. Series pairs are
    # NON-matches whose Neighbor-List co-occurrence frequency rivals true
    # matches (flooding RCF), while their shared blocks hold ~14 profiles
    # and are ARCS-discounted — true matches keep a unique subtitle token
    # whose block contains exactly the pair. This is the structure that
    # lets PPS overtake GS-PSN on real movie data (§7.2).
    series_pool: list[dict] = []

    def entity() -> dict:
        if g.random() < 0.45:
            if not series_pool or g.random() < 0.15:
                series_pool.append(
                    {
                        "base": _with_stopwords(g, phrase(g, title_words, 2)),
                        "director": f"{persons[int(g.integers(0, 3000))]} {persons[int(g.integers(0, 3000))]}",
                        "genre": genres[int(g.integers(0, 20))],
                    }
                )
            base = series_pool[int(g.integers(0, len(series_pool)))]
            return {
                "title": f"{base['base']} {phrase(g, title_words, 1)}{int(g.integers(2, 10))}",
                "year": str(1950 + int(g.integers(0, 66))),
                "director": base["director"],
                "genre": base["genre"],
            }
        return {
            "title": _with_stopwords(g, phrase(g, title_words, int(g.integers(2, 5)))),
            "year": str(1950 + int(g.integers(0, 66))),
            "director": f"{persons[int(g.integers(0, 3000))]} {persons[int(g.integers(0, 3000))]}",
            "genre": genres[int(g.integers(0, 20))],
        }

    def imdb_profile(ent: dict) -> dict:
        return {
            "title": ent["title"],
            "year": ent["year"],
            "director": ent["director"],
            "genre": ent["genre"],
        }

    def dbp_profile(ent: dict) -> dict:
        title = corrupt_phrase(g, ent["title"], p_typo=0.1, p_drop=0.05)
        director = ent["director"] if g.random() < 0.8 else phrase(g, persons, 2)
        return {
            "title": title,
            "year": ent["year"] if g.random() < 0.9 else str(int(ent["year"]) + 1),
            "director": director,
            "genre": ent["genre"],
            "starring": phrase(g, persons, int(g.integers(2, 4))),
            "runtime": f"{int(g.integers(80, 200))} minutes",
            "country": countries[int(g.integers(0, 15))],
        }

    b = ProfileBuilder()
    shared = [entity() for _ in range(n_match)]
    pids1 = [b.new_pid() for _ in range(n1)]
    pids2 = [b.new_pid() for _ in range(n2)]
    for k, pid in enumerate(pids1):
        ent = shared[k] if k < n_match else entity()
        b.add(pid, 1, imdb_profile(ent))
    for k, pid in enumerate(pids2):
        ent = shared[k] if k < n_match else entity()
        b.add(pid, 2, dbp_profile(ent))
    for k in range(n_match):
        b.matches.append((pids1[k], pids2[k]))
    profiles, gt = b.build(spark)
    return Dataset.of("movies", CLEAN, profiles, gt)


def dbpedia_like(spark: SparkSession, *, scale: float = 0.003, seed: int = 5) -> Dataset:
    """dbpedia: two snapshots sharing ~25% of their name-value pairs."""
    g = rng(seed)
    n1, n2, n_match = _counts(_DBPEDIA, scale)
    names = vocabulary(seed + 10, 4000)
    attr_vocab = vocabulary(seed + 11, max(60, int(0.02 * (n1 + n2))))
    value_words = vocabulary(seed + 12, 2500)

    def fact() -> tuple[str, str]:
        attr = attr_vocab[int(g.integers(0, len(attr_vocab)))]
        r = g.random()
        if r < 0.4:
            value = _with_stopwords(
                g, value_words[int(g.integers(0, len(value_words)))], p=0.5
            )
        elif r < 0.7:
            value = f"http://dbpedia.org/resource/{names[int(g.integers(0, len(names)))].capitalize()}"
        elif r < 0.85:
            value = str(int(g.integers(1, 100000)))
        else:
            value = _with_stopwords(g, phrase(g, value_words, 2))
        return attr, value

    # Disambiguation families ("X (film)", "X (novel)", …): non-matching
    # entities sharing name tokens — same RCF-flooding role as the movie
    # series above.
    family_pool: list[str] = []

    def entity() -> dict:
        if g.random() < 0.3:
            if not family_pool or g.random() < 0.15:
                family_pool.append(phrase(g, names, 2))
            base = family_pool[int(g.integers(0, len(family_pool)))]
            name = f"{base} {names[int(g.integers(0, len(names)))]}"
        else:
            name = _with_stopwords(g, phrase(g, names, int(g.integers(1, 4))), p=0.3)
        return {
            "name": name,
            "facts": [fact() for _ in range(18)],
        }

    def snapshot(ent: dict, second: bool) -> dict:
        # Each snapshot samples 7 of the 18-fact pool independently →
        # expected shared facts ≈ 2.7, ~25% of the union (paper fn. 2).
        idx = g.choice(18, size=7, replace=False)
        attrs: dict[str, str] = {}
        name = ent["name"]
        if second:
            name = corrupt_phrase(g, name, p_typo=0.1, p_drop=0.15)
        attrs["name"] = name
        for t in idx:
            a, v = ent["facts"][int(t)]
            attrs.setdefault(a, v)
        return attrs

    b = ProfileBuilder()
    shared = [entity() for _ in range(n_match)]
    pids1 = [b.new_pid() for _ in range(n1)]
    pids2 = [b.new_pid() for _ in range(n2)]
    for k, pid in enumerate(pids1):
        ent = shared[k] if k < n_match else entity()
        b.add(pid, 1, snapshot(ent, second=False))
    for k, pid in enumerate(pids2):
        ent = shared[k] if k < n_match else entity()
        b.add(pid, 2, snapshot(ent, second=True))
    for k in range(n_match):
        b.matches.append((pids1[k], pids2[k]))
    profiles, gt = b.build(spark)
    return Dataset.of("dbpedia", CLEAN, profiles, gt)


def freebase_like(spark: SparkSession, *, scale: float = 0.001, seed: int = 6) -> Dataset:
    """freebase: URI-dominated RDF profiles; equality evidence survives,
    alphabetical-proximity evidence drowns in zipfian URI runs."""
    g = rng(seed)
    n1, n2, n_match = _counts(_FREEBASE, scale)
    names = vocabulary(seed + 10, 3000)
    type_words = vocabulary(seed + 11, 60)
    # Attribute-name variety proportional to the published 37k—11k counts;
    # schema-agnostic methods ignore the names, but Table 2 should show
    # the same per-source asymmetry.
    props1 = vocabulary(seed + 14, max(20, int(37_000 * scale * 9)))
    props2 = vocabulary(seed + 15, max(10, int(11_000 * scale * 9)))

    n_ref = max(200, (n1 + n2) // 4)
    ranks = np.arange(1, n_ref + 1, dtype=np.float64)
    ref_weights = 1.0 / ranks**1.2
    ref_weights /= ref_weights.sum()

    def entity() -> dict:
        return {
            "name": phrase(g, names, int(g.integers(1, 3))),
            # 8 candidate referents per entity; each profile samples 6.
            "refs": _zipf_choice(g, ref_weights, 8),
        }

    def rdf_profile(ent: dict, source: int) -> dict:
        attrs: dict[str, str] = {}
        if g.random() < 0.6:
            name = ent["name"]
            if source == 2:
                name = corrupt_phrase(g, name, p_typo=0.15, p_drop=0.3)
            attrs["label"] = name
        props = props1 if source == 1 else props2
        refs = g.choice(8, size=6, replace=False)
        for r in refs:
            # Canonical referent URIs shared across sources (sameAs-aligned);
            # the property *name* varies per source and statement.
            attrs.setdefault(
                f"p_{props[int(g.integers(0, len(props)))]}",
                f"http://kb.example.org/entity/e{ent['refs'][int(r)]:07d}",
            )
        ns = "rdf.freebase.com/ns/type" if source == 1 else "dbpedia.org/ontology"
        for k in range(int(g.integers(2, 4))):
            attrs[f"type{k}"] = f"http://{ns}.{type_words[int(g.integers(0, 60))]}"
        for k in range(int(g.integers(2, 4))):  # per-profile noise URIs
            attrs[f"id{k}"] = (
                f"http://rdf.freebase.com/ns/m.{g.integers(0, 16**8):08x}"
                if source == 1
                else f"http://dbpedia.org/resource/x{g.integers(0, 16**8):08x}"
            )
        return attrs

    b = ProfileBuilder()
    shared = [entity() for _ in range(n_match)]
    pids1 = [b.new_pid() for _ in range(n1)]
    pids2 = [b.new_pid() for _ in range(n2)]
    for k, pid in enumerate(pids1):
        ent = shared[k] if k < n_match else entity()
        b.add(pid, 1, rdf_profile(ent, source=1))
    for k, pid in enumerate(pids2):
        ent = shared[k] if k < n_match else entity()
        b.add(pid, 2, rdf_profile(ent, source=2))
    for k in range(n_match):
        b.matches.append((pids1[k], pids2[k]))
    profiles, gt = b.build(spark)
    return Dataset.of("freebase", CLEAN, profiles, gt)
