"""Benchmark registry: name -> generator."""
from __future__ import annotations

from typing import Callable

from repro.benchdata.base import Benchmark
from repro.benchdata.beers import beers
from repro.benchdata.flights import flights
from repro.benchdata.hospital import hospital
from repro.benchdata.movies import movies
from repro.benchdata.rayyan import rayyan

BENCHMARKS: dict[str, Callable[..., Benchmark]] = {
    "hospital": hospital,
    "flights": flights,
    "beers": beers,
    "rayyan": rayyan,
    "movies": movies,
}


def load(name: str, **kwargs) -> Benchmark:
    """Generate benchmark ``name`` with its default seed."""
    return BENCHMARKS[name](**kwargs)
