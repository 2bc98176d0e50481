"""Synthetic Movies benchmark (7390 x 17, the paper's largest dataset).

Mirrors the Magellan Movies benchmark. Error mixture per Table 2:
184 typos (director x-substitutions + doubled-letter title typos),
14433 column-type cells (duration "100 min"/"1 hour 40 min" -> "100.0",
rating_value "7.8/10" -> "7.8" — the §3.2 and Appendix B examples),
131 DMVs and 938 misplacement cells (language <-> country swapped in
469 rows). ``scale`` multiplies the row count for the scalability
benchmark while keeping the same error *rates*.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.benchdata import vocab
from repro.benchdata.base import Benchmark
from repro.benchdata.inject import Injector
from repro.llm.knowledge import COUNTRIES, LANGUAGE_CODES

N_ROWS = 7390

_LANG_NAMES = tuple(n.capitalize() for n in LANGUAGE_CODES)


def movies(seed: int = 4, scale: int = 1) -> Benchmark:
    rng = np.random.default_rng(seed)
    n_rows = N_ROWS * scale
    directors = list({vocab.person_name(rng) for _ in range(330)})
    lang_p = np.array([0.6] + [0.4 / (len(_LANG_NAMES) - 1)] * (len(_LANG_NAMES) - 1))
    rows = []
    for i in range(n_rows):
        minutes = int(rng.integers(62, 215))
        use_hours = rng.random() < 0.15
        duration = (
            f"{minutes // 60} hour {minutes % 60} min" if use_hours
            else f"{minutes} min"
        )
        rows.append({
            "row_id": str(i),
            "name": (
                f"{rng.choice(vocab.MOVIE_WORDS)} {rng.choice(vocab.MOVIE_WORDS)}"
            ),
            "year": str(rng.integers(1925, 2016)),
            "release_date": (
                f"{rng.integers(1925, 2016)}-{rng.integers(1, 13):02d}-"
                f"{rng.integers(1, 29):02d}"
            ),
            "director": str(rng.choice(directors)),
            "creator": vocab.person_name(rng),
            "cast_1": vocab.person_name(rng),
            "cast_2": vocab.person_name(rng),
            "language": str(rng.choice(_LANG_NAMES, p=lang_p)),
            "country": str(rng.choice(COUNTRIES)),
            "duration": duration,
            "rating_value": f"{rng.integers(10, 100) / 10:.1f}/10",
            "rating_count": str(rng.integers(100, 900000)),
            "genre": str(rng.choice(vocab.GENRES)),
            "mpaa_rating": str(rng.choice(vocab.MPAA)),
            "production_company": str(rng.choice(vocab.STUDIOS)),
            "description": " ".join(
                str(w).lower() for w in
                rng.choice(vocab.MOVIE_WORDS, size=6, replace=False)
            ),
            "site": f"http://allmovies.example.com/m/{i + 1}",
        })
    truth = pd.DataFrame(rows).astype(object)

    # true nulls (216 per scale): absent duration/rating values, in both
    # dirty and truth — not errors.
    for col, k in (("duration", 108), ("rating_value", 108)):
        for r in rng.choice(n_rows, size=k * scale, replace=False):
            truth.at[r, col] = None

    dirty = truth.copy()
    inj = Injector(dirty, truth, rng)

    # typos (184 per scale)
    inj.typo_x("director", 120 * scale)
    inj.typo_duplicate_char("name", 64 * scale)
    # misplacement (938 cells per scale): language <-> country
    inj.swap("language", "country", 469 * scale)
    # DMV (131 per scale)
    inj.dmv("duration", 66 * scale)
    inj.dmv("rating_value", 65 * scale)
    # column type (14433 cells per scale)
    from repro.llm.knowledge import parse_duration_minutes, parse_rating
    inj.canonicalize_type_column(
        "duration", lambda v: f"{parse_duration_minutes(v):.1f}")
    inj.canonicalize_type_column(
        "rating_value", lambda v: f"{parse_rating(v):.1f}")

    return Benchmark(name="movies" if scale == 1 else f"movies_x{scale}",
                     dirty=dirty, clean=truth, mask=inj.mask_frame())
