"""Synthetic Rayyan benchmark (1000 x 11).

Mirrors the Rayyan systematic-review benchmark: article records joined
to ~25 journals. Error mixture: heavy open-vocabulary typos in article
titles (the paper's "obvious typos for LLMs"), x-substitution typos in
repeated journal titles, the paper's Example 1 language inconsistency
("English" vs "eng"), FD violations on journal_issn ->
journal_abbreviation, cross-column misplacement between
article_language and journal_country, and DMVs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.benchdata import vocab
from repro.benchdata.base import Benchmark
from repro.benchdata.inject import Injector
from repro.llm.knowledge import COUNTRIES, LANGUAGE_CODES

N_ROWS = 1000

_LANG_NAME = {code: name.capitalize() for name, code in LANGUAGE_CODES.items()}


def _language_variant(v: str, rng: np.random.Generator) -> str | None:
    return _LANG_NAME.get(v)


def rayyan(seed: int = 3) -> Benchmark:
    rng = np.random.default_rng(seed)
    journals = []
    for i, (title, abbrev) in enumerate(vocab.JOURNALS):
        journals.append({
            "journal_title": title,
            "journal_abbreviation": abbrev,
            "journal_issn": f"{1000 + i * 37:04d}-{2000 + i * 53:04d}",
            "journal_country": str(COUNTRIES[i % len(COUNTRIES)]),
        })
    lang_codes = list(LANGUAGE_CODES.values())
    lang_p = np.array([0.55] + [0.45 / (len(lang_codes) - 1)] * (len(lang_codes) - 1))
    rows = []
    for i in range(N_ROWS):
        j = journals[i % len(journals)]
        n_words = int(rng.integers(5, 8))
        words = rng.choice(vocab.TITLE_WORDS, size=n_words, replace=False)
        title = " ".join(words).capitalize()
        rows.append({
            "row_id": str(i),
            "article_title": title,
            "article_language": str(rng.choice(lang_codes, p=lang_p)),
            **j,
            "article_jvolumn": str(rng.integers(1, 60)),
            "article_jissue": str(rng.integers(1, 13)),
            "article_pagination": f"{rng.integers(1, 900)}-{rng.integers(900, 1400)}",
            "article_jcreated_at": (
                f"{rng.integers(1995, 2016)}-{rng.integers(1, 13):02d}-"
                f"{rng.integers(1, 29):02d}"
            ),
            "author_list": ", ".join(
                vocab.person_name(rng) for _ in range(int(rng.integers(1, 4)))
            ),
        })
    truth = pd.DataFrame(rows).astype(object)
    dirty = truth.copy()
    inj = Injector(dirty, truth, rng)

    # open-vocabulary title typos (280) + repeated journal-title typos (60)
    inj.typo_duplicate_char("article_title", 280)
    inj.typo_x("journal_title", 60)
    # Example-1 language inconsistency (120): "eng" -> "English" etc.
    inj.inconsistent("article_language", 120, _language_variant)
    # FD violations (80): wrong abbreviation for the journal's ISSN
    inj.wrong_value("journal_abbreviation", 80,
                    pool=[j["journal_abbreviation"] for j in journals])
    # misplacement (80 rows = 160 cells): language <-> country swapped
    inj.swap("article_language", "journal_country", 80)
    # DMV (90)
    inj.dmv("author_list", 50)
    inj.dmv("article_pagination", 40)

    return Benchmark(name="rayyan", dirty=dirty, clean=truth,
                     mask=inj.mask_frame())
