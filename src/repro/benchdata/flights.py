"""Synthetic Flights benchmark (2376 x 7).

Mirrors the classic Flights benchmark: 198 flights, each reported by 12
websites, with conflicting actual departure/arrival times. The paper's
central observation is reproduced structurally:

* **ambiguous flights** (90): actual times scattered 5/4/2/1 across the
  12 reports — no confident majority. For 70% of them the true time is
  the mode, for 30% it is the runner-up, so mode-voting repairs
  (Baran's vicinity model) gain recall at a precision cost while
  Cocoon's FD repair abstains (high precision, low recall — the
  paper's Flights crossover).
* **clear flights** (108): 3 of 12 reports wrong — a 75% majority that
  any FD repair fixes.
* scheduled-time columns carry trailing-junk typos and a few clear FD
  violations.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.benchdata import vocab
from repro.benchdata.base import Benchmark, ErrorType
from repro.benchdata.inject import Injector

N_FLIGHTS = 198
N_SOURCES = 12
N_AMBIGUOUS = 90
N_CLEAR = 108


def _fmt(minutes: int) -> str:
    minutes %= 24 * 60
    h, m = divmod(minutes, 60)
    suffix = "a.m." if h < 12 else "p.m."
    h12 = h % 12 or 12
    return f"{h12}:{m:02d} {suffix}"


def flights(seed: int = 1) -> Benchmark:
    rng = np.random.default_rng(seed)
    flights_meta = []
    used = set()
    while len(flights_meta) < N_FLIGHTS:
        carrier = str(rng.choice(vocab.CARRIERS))
        num = int(rng.integers(100, 9999))
        orig, dest = rng.choice(vocab.AIRPORTS, size=2, replace=False)
        key = f"{carrier}-{num}-{orig}-{dest}"
        if key in used:
            continue
        used.add(key)
        dep = int(rng.integers(5 * 60, 22 * 60))
        dur = int(rng.integers(60, 360))
        flights_meta.append({
            "flight": key,
            "sched_dep_time": _fmt(dep),
            "act_dep_time": _fmt(dep + int(rng.integers(-10, 30))),
            "sched_arr_time": _fmt(dep + dur),
            "act_arr_time": _fmt(dep + dur + int(rng.integers(-10, 45))),
        })

    rows = []
    for i in range(N_FLIGHTS):
        for s in range(N_SOURCES):
            rows.append({
                "row_id": str(i * N_SOURCES + s),
                "src": vocab.FLIGHT_SOURCES[s],
                "flight_date": "12/01/2011",
                **flights_meta[i],
            })
    truth = pd.DataFrame(rows).astype(object)
    dirty = truth.copy()
    inj = Injector(dirty, truth, rng)

    # conflicting actual times. Variants are the true time +/- a few
    # minutes; the error mask is every report whose time != ground truth.
    order = rng.permutation(N_FLIGHTS)
    ambiguous, clear = order[:N_AMBIGUOUS], order[N_AMBIGUOUS:N_AMBIGUOUS + N_CLEAR]
    for col in ("act_dep_time", "act_arr_time"):
        for j, fi in enumerate(ambiguous):
            base = truth.at[fi * N_SOURCES, col]
            base_min = _parse_back(base)
            variants = [base]
            while len(variants) < 4:
                v = _fmt(base_min + int(rng.integers(-9, 10)))
                if v not in variants:
                    variants.append(v)
            rows_f = list(range(fi * N_SOURCES, fi * N_SOURCES + N_SOURCES))
            rng.shuffle(rows_f)
            # report distribution 5/4/2/1 over the 12 sites
            assign = ([variants[0]] * 5 + [variants[1]] * 4
                      + [variants[2]] * 2 + [variants[3]] * 1)
            # in 30% of ambiguous groups the true time is the runner-up,
            # so always-pick-the-mode repairs (Baran's vicinity model)
            # buy recall at a precision cost, while confidence-gated
            # repairs (Cocoon) abstain — the paper's Flights crossover
            truth_val = variants[0] if j % 10 < 7 else variants[1]
            for r, v in zip(rows_f, assign):
                dirty.at[r, col] = v
                truth.at[r, col] = truth_val
                if v != truth_val:
                    inj.used.add((r, col))
                    inj.records.append((dirty.at[r, "row_id"], col,
                                        ErrorType.FD))
        for fi in clear:
            rows_f = list(range(fi * N_SOURCES, fi * N_SOURCES + N_SOURCES))
            picks = rng.choice(rows_f, size=3, replace=False)
            base_min = _parse_back(truth.at[fi * N_SOURCES, col])
            for r in picks:
                v = _fmt(base_min + int(rng.integers(1, 10)))
                if v == truth.at[r, col]:
                    continue
                dirty.at[r, col] = v
                inj.used.add((r, col))
                inj.records.append((dirty.at[r, "row_id"], col, ErrorType.FD))

    # scheduled columns: trailing-junk typos + clear FD violations + DMV
    _trailing_junk(inj, "sched_dep_time", 80, rng)
    _trailing_junk(inj, "sched_arr_time", 70, rng)
    inj.wrong_value("sched_dep_time", 60,
                    pool=[m["sched_dep_time"] for m in flights_meta])
    inj.wrong_value("sched_arr_time", 40,
                    pool=[m["sched_arr_time"] for m in flights_meta])
    inj.dmv("sched_arr_time", 40)

    return Benchmark(name="flights", dirty=dirty, clean=truth,
                     mask=inj.mask_frame())


def _parse_back(v: str) -> int:
    hm, suffix = v.split(" ")
    h, m = (int(x) for x in hm.split(":"))
    h %= 12
    if suffix.startswith("p"):
        h += 12
    return h * 60 + m


def _trailing_junk(inj: Injector, column: str, n: int,
                   rng: np.random.Generator) -> None:
    for row in inj._pick_rows(column, n):
        v = str(inj.dirty.at[row, column])
        inj.dirty.at[row, column] = v + str(rng.choice(list("xqzk")))
        inj._record(row, column, ErrorType.TYPO)
