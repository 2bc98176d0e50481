"""Synthetic Beers benchmark (2410 x 11).

Mirrors the classic Beers benchmark: ~178 breweries x ~13 beers, with
the error classes the paper highlights for this dataset: unit
inconsistency in ``ounces`` ("12.0 oz" vs "12.0 ounce" vs "12 oz" —
the "oz"/"ounce" example from §3.2), FD violations on brewery_id ->
brewery_name/city/state, x-substitution typos, and a column-type column
(``abv`` "5.5%" -> "5.5", excluded from Table 1 scoring).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.benchdata import vocab
from repro.benchdata.base import Benchmark
from repro.benchdata.inject import Injector
from repro.llm.knowledge import CITIES, US_STATES

N_ROWS = 2410
N_BREWERIES = 178


def _ounce_variant(v: str, rng: np.random.Generator) -> str | None:
    num = v.split(" ")[0]
    choice = rng.integers(0, 3)
    if choice == 0:
        return f"{num} ounce"
    if choice == 1:
        return f"{num.removesuffix('.0')} oz"
    return f"{num} OZ"


def beers(seed: int = 2) -> Benchmark:
    rng = np.random.default_rng(seed)
    breweries = []
    for i in range(N_BREWERIES):
        breweries.append({
            "brewery_id": f"BRW-{i + 1:03d}",
            "brewery_name": (
                f"{vocab.BREWERY_WORDS[i % len(vocab.BREWERY_WORDS)]} "
                f"{vocab.BREWERY_SUFFIXES[i % len(vocab.BREWERY_SUFFIXES)]}"
            ),
            "city": CITIES[i % len(CITIES)],
            "state": list(US_STATES.values())[i % 50],
            "brewery_type": vocab.BREWERY_TYPES[i % 4],
            "established": str(1980 + i % 40),
        })
    rows = []
    for i in range(N_ROWS):
        b = breweries[i % N_BREWERIES]
        oz = float(rng.choice([12.0, 12.0, 12.0, 16.0, 32.0]))
        rows.append({
            "row_id": str(i),
            "beer_name": (
                f"{rng.choice(vocab.BEER_NAME_WORDS)} "
                f"{rng.choice(vocab.BEER_NAME_KINDS)}"
            ),
            "style": str(rng.choice(vocab.BEER_STYLES)),
            "abv": f"{rng.integers(30, 131) / 10:.1f}%",
            "ibu": str(rng.integers(5, 120)),
            "ounces": f"{oz:.1f} oz",
            **b,
        })
    truth = pd.DataFrame(rows).astype(object)
    dirty = truth.copy()
    inj = Injector(dirty, truth, rng)

    # unit inconsistency (600): alternative renderings of the same volume
    inj.inconsistent("ounces", 600, _ounce_variant)
    # FD violations (60) on brewery_id -> name/city/state
    inj.wrong_value("brewery_name", 24,
                    pool=[b["brewery_name"] for b in breweries])
    inj.wrong_value("city", 20, pool=list(CITIES))
    inj.wrong_value("state", 16, pool=list(US_STATES.values()))
    # typos (100): x-substitutions in repeated entity names
    inj.typo_x("brewery_name", 60)
    inj.typo_x("style", 40)
    # column type: abv percent -> double (2410 cells, Table-1-excluded)
    inj.canonicalize_type_column("abv", lambda v: f"{float(v.rstrip('%')):.1f}")

    return Benchmark(name="beers", dirty=dirty, clean=truth,
                     mask=inj.mask_frame())
