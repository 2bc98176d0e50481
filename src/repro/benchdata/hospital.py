"""Synthetic Hospital benchmark (1000 x 19).

Mirrors the classic Hospital benchmark's structure: ~55 hospitals x ~18
quality measures, denormalized to 1000 rows, with the paper's Table 2
error mixture: 213 x-substitution typos, 331 FD violations (zip ->
city/state, measure_code -> measure_name), 3000 column-type cells
(emergency_service yes/no -> bool, score "NN%" -> double, sample
"NN patients" -> double) and 227 disguised missing values.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.benchdata import vocab
from repro.benchdata.base import Benchmark
from repro.benchdata.inject import Injector
from repro.llm.knowledge import CITIES, US_STATES

N_ROWS = 1000
N_HOSPITALS = 55


def _hospitals(rng: np.random.Generator) -> list[dict]:
    """Hospital entities with mutually distant provider ids and unique
    zips, so typo targets are unambiguous (see DESIGN.md)."""
    ids: list[str] = []
    while len(ids) < N_HOSPITALS:
        cand = str(rng.integers(10000, 99999))
        if all(sum(a != b for a, b in zip(cand, e)) >= 2 for e in ids):
            ids.append(cand)
    states = list(US_STATES.values())
    hospitals = []
    used_zip: set[str] = set()
    for i in range(N_HOSPITALS):
        city = CITIES[i % len(CITIES)]
        state = states[i % len(states)]
        zip_code = None
        while zip_code is None or zip_code in used_zip:
            zip_code = f"{rng.integers(10000, 99999)}"
        used_zip.add(zip_code)
        hospitals.append({
            "provider_id": ids[i],
            "hospital_name": (
                f"{vocab.HOSPITAL_NAME_PARTS[0][i % 14]} "
                f"{vocab.HOSPITAL_NAME_PARTS[1][i % 6]}"
            ),
            "address": f"{rng.integers(100, 9999)} {rng.choice(vocab.STREETS)}",
            "city": str(city),
            "state": state,
            "zip": zip_code,
            "county": f"{city} County",
            "phone": f"{rng.integers(200, 999)}-555-{rng.integers(1000, 9999)}",
            "hospital_type": vocab.HOSPITAL_TYPES[i % 3],
            "hospital_owner": vocab.HOSPITAL_OWNERS[i % 5],
            "emergency_service": "yes" if i % 3 else "no",
            "certification": "Certified" if i % 4 else "Not Certified",
            "region": vocab.REGIONS[i % 5],
        })
    return hospitals


def hospital(seed: int = 0) -> Benchmark:
    rng = np.random.default_rng(seed)
    hs = _hospitals(rng)
    rows = []
    for i in range(N_ROWS):
        h = hs[i % N_HOSPITALS]
        code, mname = vocab.MEASURES[(i * 7) % len(vocab.MEASURES)]
        rows.append({
            "row_id": str(i),
            **h,
            "condition": mname.rsplit(" measure", 1)[0],
            "measure_code": code,
            "measure_name": mname,
            "score": f"{rng.integers(55, 100)}%",
            "sample": f"{rng.integers(5, 200)} patients",
            "stateavg": f"{h['state'].lower()}_{code.lower()}_avg",
        })
    truth = pd.DataFrame(rows).astype(object)
    dirty = truth.copy()
    inj = Injector(dirty, truth, rng)

    # typos (213): x-substitutions in frequently repeated entity columns
    inj.typo_x("hospital_name", 80)
    inj.typo_x("address", 70)
    inj.typo_x("phone", 63)
    # FD violations (331): valid-but-wrong values inside FD groups
    inj.wrong_value("city", 120, pool=list(CITIES))
    inj.wrong_value("state", 100, pool=list(US_STATES.values()))
    inj.wrong_value("measure_name", 111, pool=[m for _, m in vocab.MEASURES])
    # DMV (227)
    inj.dmv("county", 100)
    inj.dmv("phone", 77)
    inj.dmv("stateavg", 50)
    # column-type canonicalization (3 x 1000 = 3000)
    inj.canonicalize_type_column(
        "emergency_service", lambda v: str(v.strip().lower() == "yes"))
    inj.canonicalize_type_column(
        "score", lambda v: f"{float(v.rstrip('%')):.1f}")
    inj.canonicalize_type_column(
        "sample", lambda v: f"{float(v.split()[0]):.1f}")

    return Benchmark(name="hospital", dirty=dirty, clean=truth,
                     mask=inj.mask_frame())
