"""The 12 named evaluation data sets of Tables 3-5, at reproduction scale.

Names mirror the paper's rows; the suffix records *our* point count
(the paper used 0.93M-24.9M points on a 192 GB machine; DESIGN.md §4/§6
documents the scaling and the synthetic stand-ins for the four
real-world sets). Sizes scale with the REPRO_BENCH_SCALE env var
(default 1.0) so the whole suite stays laptop-sized; higher dimensions
get smaller n because WSPD sizes grow exponentially with d, exactly the
effect the paper discusses.
"""
from __future__ import annotations

import os
from typing import Callable

import numpy as np

from .. import synth_data as sd

_SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "1.0"))


def _n(base: int) -> int:
    return max(64, int(base * _SCALE))


# name -> (generator(n) -> (n, d) array, base n)
_REGISTRY: dict[str, tuple[Callable[[int], np.ndarray], int]] = {
    "2D-UniformFill": (lambda n: sd.uniform_fill(n, 2, seed=11), 10_000),
    "3D-UniformFill": (lambda n: sd.uniform_fill(n, 3, seed=12), 10_000),
    "5D-UniformFill": (lambda n: sd.uniform_fill(n, 5, seed=13), 6_000),
    "7D-UniformFill": (lambda n: sd.uniform_fill(n, 7, seed=14), 4_000),
    "2D-SS-varden": (lambda n: sd.ss_varden(n, 2, seed=21), 10_000),
    "3D-SS-varden": (lambda n: sd.ss_varden(n, 3, seed=22), 10_000),
    "5D-SS-varden": (lambda n: sd.ss_varden(n, 5, seed=23), 6_000),
    "7D-SS-varden": (lambda n: sd.ss_varden(n, 7, seed=24), 4_000),
    "3D-GeoLife": (lambda n: sd.geolife_like(n, seed=31), 10_000),
    "7D-Household": (lambda n: sd.household_like(n, seed=32), 4_000),
    "10D-HT": (lambda n: sd.ht_like(n, seed=33), 4_000),
    "16D-CHEM": (lambda n: sd.chem_like(n, seed=34), 2_000),
}

ALL_DATASETS = list(_REGISTRY)


def dataset_size(name: str) -> int:
    return _n(_REGISTRY[name][1])


def load(name: str) -> np.ndarray:
    """Materialize a named data set at reproduction scale."""
    gen, base = _REGISTRY[name]
    return gen(_n(base))


def display_name(name: str) -> str:
    """Paper-style row label with our actual size, e.g.
    '2D-UniformFill-10K'."""
    n = dataset_size(name)
    if n >= 1000 and n % 1000 == 0:
        return f"{name}-{n // 1000}K"
    return f"{name}-{n}"
