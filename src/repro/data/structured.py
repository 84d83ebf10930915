"""Synthetic analogues of the four structured Dirty-ER datasets (Table 2).

Each generator reproduces the published |P|, the match-pair count |D_P|,
the attribute schema size, the ~|p̄| name-value density, the equivalence-
cluster structure, and the noise family the paper credits for the
observed method ranking (curated data → character-level typos that keep
corrupted tokens alphabetically adjacent; see `repro.data.noise`).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import SparkSession

from repro.common import DIRTY
from repro.data.base import Dataset, ProfileBuilder
from repro.data.noise import corrupt_phrase, digits, typo, vowel_typo
from repro.data.vocab import ZipfVocab, phrase, rng, vocabulary

# cora's heavy-tailed equivalence clusters: Σ C(k,2) = 17,184 pairs over
# 560 profiles, plus 735 singletons → |P| = 1,295 (paper: 1.3k / 17k).
_CORA_CLUSTER_SIZES = [100, 80, 70, 60, 55, 50, 45, 40, 20, 15, 14, 7, 2, 2]


def _maybe(g: np.random.Generator, p: float, value: str) -> str | None:
    return value if g.random() < p else None


def census_like(spark: SparkSession, *, seed: int = 0) -> Dataset:
    """census: 841 profiles, 5 attrs, 344 duplicate pairs, |p̄|≈4.65.

    Short, discriminative values (surname/zip) — the regime where the
    schema-based Soundex key excels and co-occurrence evidence is sparse.
    """
    g = rng(seed)
    surnames = vocabulary(seed + 10, 400)
    firstnames = vocabulary(seed + 11, 200, min_syl=2, max_syl=3)
    cities = vocabulary(seed + 12, 30)
    # Low-cardinality zip pool: discriminative only in *combination* with
    # the surname (the PSN key), individually a frequent token.
    zips = [digits(rng(seed + 13), 5) for _ in range(30)]
    b = ProfileBuilder()

    def profile(ent: dict, duplicate: bool) -> dict:
        sn, fn, zc, hn = ent["sn"], ent["fn"], ent["zc"], ent["hn"]
        if duplicate:
            # Mostly Soundex-invariant vowel noise: exact-token equality
            # breaks, the schema key survives (census regime, §7.1).
            r = g.random()
            if r < 0.55:
                sn = vowel_typo(g, sn)
            elif r < 0.65:
                sn = typo(g, sn)
            r = g.random()
            if r < 0.4:
                fn = vowel_typo(g, fn)
            elif r < 0.5:
                fn = typo(g, fn)
            if g.random() < 0.15:
                zc = zips[int(g.integers(0, len(zips)))]
            if g.random() < 0.5:
                hn = digits(g, 3)
        p = 0.93  # 5 attrs × 0.93 ≈ 4.65 name-value pairs per profile
        return {
            "surname": _maybe(g, p, sn),
            "firstname": _maybe(g, p, fn),
            "zipcode": _maybe(g, p, zc),
            "city": _maybe(g, p, ent["city"]),
            "housenum": _maybe(g, p, hn),
        }

    def entity() -> dict:
        return {
            "sn": surnames[int(g.integers(0, len(surnames)))],
            "fn": firstnames[int(g.integers(0, len(firstnames)))],
            "zc": zips[int(g.integers(0, len(zips)))],
            "city": cities[int(g.integers(0, len(cities)))],
            "hn": digits(g, 3),
        }

    for _ in range(344):  # duplicated entities (clusters of 2)
        ent = entity()
        pids = [b.new_pid(), b.new_pid()]
        b.add(pids[0], 0, profile(ent, duplicate=False))
        b.add(pids[1], 0, profile(ent, duplicate=True))
        b.add_cluster_pairs(pids)
    for _ in range(153):  # singletons
        b.add(b.new_pid(), 0, profile(entity(), duplicate=False))
    profiles, gt = b.build(spark)
    return Dataset.of("census", DIRTY, profiles, gt)


def restaurant_like(spark: SparkSession, *, seed: int = 1) -> Dataset:
    """restaurant: 864 profiles, 5 attrs, 112 duplicate pairs, |p̄|≈5.

    High token overlap between matches, non-discriminative city/cuisine —
    the regime where schema-agnostic co-occurrence beats the schema key.
    """
    g = rng(seed)
    words = ZipfVocab(vocabulary(seed + 10, 3000))
    streets = ZipfVocab(vocabulary(seed + 11, 1500))
    cities = vocabulary(seed + 12, 8)
    cuisines = vocabulary(seed + 13, 12)

    def entity() -> dict:
        return {
            "name": words.phrase(g, int(g.integers(2, 4))),
            "street": f"{digits(g, 3)} {streets.word(g)} street",
            "city": cities[int(g.integers(0, len(cities)))],
            "phone": f"{digits(g, 3)}-{digits(g, 3)}-{digits(g, 4)}",
            "cuisine": cuisines[int(g.integers(0, len(cuisines)))],
        }

    def profile(ent: dict, duplicate: bool) -> dict:
        name, street, phone = ent["name"], ent["street"], ent["phone"]
        if duplicate:
            name = corrupt_phrase(g, name, p_typo=0.2, p_drop=0.1)
            street = corrupt_phrase(g, street, p_typo=0.15, p_drop=0.1)
            if g.random() < 0.5:  # reformatted phone → different tokens
                phone = phone.replace("-", " ")
        return {
            "name": name,
            "addr": street,
            "city": ent["city"],
            "phone": phone,
            "type": ent["cuisine"],
        }

    b = ProfileBuilder()
    for _ in range(112):
        ent = entity()
        pids = [b.new_pid(), b.new_pid()]
        b.add(pids[0], 0, profile(ent, duplicate=False))
        b.add(pids[1], 0, profile(ent, duplicate=True))
        b.add_cluster_pairs(pids)
    for _ in range(640):
        b.add(b.new_pid(), 0, profile(entity(), duplicate=False))
    profiles, gt = b.build(spark)
    return Dataset.of("restaurant", DIRTY, profiles, gt)


def cora_like(spark: SparkSession, *, seed: int = 2) -> Dataset:
    """cora: 1,295 profiles, 12 attrs, 17,184 duplicate pairs, |p̄|≈5.5.

    Bibliographic records with huge equivalence clusters; authors/years
    repeat across entities, so the schema key collides (coincidental
    proximity) while token overlap between variants stays high.
    """
    g = rng(seed)
    persons = vocabulary(seed + 10, 80)
    title_words = ZipfVocab(vocabulary(seed + 11, 5000))
    venue_words = vocabulary(seed + 12, 60)
    pub_words = vocabulary(seed + 13, 40)
    months = [f"month{i:02d}" for i in range(1, 13)]

    def entity() -> dict:
        return {
            "author": f"{persons[int(g.integers(0, 80))]} {persons[int(g.integers(0, 80))]}",
            "title": title_words.phrase(g, int(g.integers(4, 8))),
            "venue": phrase(g, venue_words, int(g.integers(2, 4))),
            "year": str(1970 + int(g.integers(0, 30))),
            "pages": f"{int(g.integers(1, 500))}--{int(g.integers(500, 999))}",
            "volume": str(int(g.integers(1, 40))),
            "publisher": phrase(g, pub_words, 1),
            "address": phrase(g, venue_words, 1),
            "month": months[int(g.integers(0, 12))],
            "editor": f"{persons[int(g.integers(0, 80))]}",
            "note": title_words.phrase(g, 2),
            "institution": phrase(g, pub_words, 2),
        }

    def profile(ent: dict, variant: bool) -> dict:
        author, title, venue, year = ent["author"], ent["title"], ent["venue"], ent["year"]
        if variant:
            title = corrupt_phrase(g, title, p_typo=0.15, p_drop=0.12)
            r = g.random()
            if r < 0.3:  # initial + surname format variant
                first, last = author.split()
                author = f"{first[0]} {last}"
            elif r < 0.65:  # "surname firstname" order variant: identical
                # tokens (schema-agnostic evidence intact) but the
                # surname-based schema key breaks — real cora's noise.
                first, last = author.split()
                author = f"{last} {first}"
            if g.random() < 0.3:
                venue = " ".join(w[:3] for w in venue.split())
            if g.random() < 0.1:
                year = str(int(year) + int(g.integers(-1, 2)))
        p_rare = 0.25  # author+title always; 2 common + 8 rare attrs → |p̄|≈5.4
        return {
            "author": author,
            "title": title,
            "venue": _maybe(g, 0.6, venue),
            "year": _maybe(g, 0.8, year),
            "pages": _maybe(g, p_rare, ent["pages"]),
            "volume": _maybe(g, p_rare, ent["volume"]),
            "publisher": _maybe(g, p_rare, ent["publisher"]),
            "address": _maybe(g, p_rare, ent["address"]),
            "month": _maybe(g, p_rare, ent["month"]),
            "editor": _maybe(g, p_rare, ent["editor"]),
            "note": _maybe(g, p_rare, ent["note"]),
            "institution": _maybe(g, p_rare, ent["institution"]),
        }

    b = ProfileBuilder()
    for size in _CORA_CLUSTER_SIZES:
        ent = entity()
        pids = [b.new_pid() for _ in range(size)]
        b.add(pids[0], 0, profile(ent, variant=False))
        for pid in pids[1:]:
            b.add(pid, 0, profile(ent, variant=True))
        b.add_cluster_pairs(pids)
    for _ in range(1295 - sum(_CORA_CLUSTER_SIZES)):
        b.add(b.new_pid(), 0, profile(entity(), variant=False))
    profiles, gt = b.build(spark)
    return Dataset.of("cora", DIRTY, profiles, gt)


def cddb_like(spark: SparkSession, *, seed: int = 3) -> Dataset:
    """cddb: 9,763 profiles, 106 attrs, 300 duplicate pairs, |p̄|≈18.7.

    Audio-CD records: 6 core attributes plus track00..track99 (100 sparse
    track attributes), long token-rich profiles, very rare duplicates.
    """
    g = rng(seed)
    artist_words = ZipfVocab(vocabulary(seed + 10, 8000))
    title_words = ZipfVocab(vocabulary(seed + 11, 20000))
    categories = vocabulary(seed + 12, 11)
    genres = vocabulary(seed + 13, 20)

    def entity(force_tracks: int | None = None) -> dict:
        # Mostly 6–19 tracks with a long-disc tail up to 99 — reproduces
        # both |p̄|≈18.75 and the 106-attribute schema of Table 2.
        if force_tracks is not None:
            n_tracks = force_tracks
        elif g.random() < 0.03:
            n_tracks = int(g.integers(20, 97))
        else:
            n_tracks = int(g.integers(6, 20))
        return {
            "artist": artist_words.phrase(g, int(g.integers(1, 3))),
            "dtitle": title_words.phrase(g, int(g.integers(2, 5))),
            "category": categories[int(g.integers(0, 11))],
            "genre": genres[int(g.integers(0, 20))],
            "year": str(1960 + int(g.integers(0, 45))),
            "cdextra": title_words.phrase(g, 2),
            "tracks": [
                title_words.phrase(g, int(g.integers(1, 4))) for _ in range(n_tracks)
            ],
        }

    def profile(ent: dict, duplicate: bool) -> dict:
        artist, dtitle, tracks = ent["artist"], ent["dtitle"], list(ent["tracks"])
        if duplicate:
            artist = corrupt_phrase(g, artist, p_typo=0.2)
            dtitle = corrupt_phrase(g, dtitle, p_typo=0.2, p_drop=0.05)
            tracks = [
                corrupt_phrase(g, t, p_typo=0.1)
                for t in tracks
                if g.random() >= 0.05  # occasionally a track is missing
            ] or tracks[:1]
        attrs = {
            "artist": artist,
            "dtitle": dtitle,
            "category": _maybe(g, 0.8, ent["category"]),
            "genre": _maybe(g, 0.7, ent["genre"]),
            "year": _maybe(g, 0.8, ent["year"]),
            "disclength": _maybe(g, 0.5, f"{int(g.integers(1800, 4800))} seconds"),
            "cdextra": _maybe(g, 0.2, ent["cdextra"]),
        }
        for t_idx, track in enumerate(tracks):
            attrs[f"track{t_idx:02d}"] = track
        return attrs

    b = ProfileBuilder()
    for _ in range(300):
        ent = entity()
        pids = [b.new_pid(), b.new_pid()]
        b.add(pids[0], 0, profile(ent, duplicate=False))
        b.add(pids[1], 0, profile(ent, duplicate=True))
        b.add_cluster_pairs(pids)
    # One 99-track disc pins the schema at 7 core + track00..track98 = 106
    # attribute names, exactly Table 2's count.
    b.add(b.new_pid(), 0, profile(entity(force_tracks=99), duplicate=False))
    for _ in range(9763 - 601):
        b.add(b.new_pid(), 0, profile(entity(), duplicate=False))
    profiles, gt = b.build(spark)
    return Dataset.of("cddb", DIRTY, profiles, gt)
