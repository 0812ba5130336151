"""Experiment configuration: dataset specs + the paper's parameter defaults
scaled to our synthetic data (DESIGN.md section 4 documents the scaling).

Two scales are provided: ``QUICK`` for unit/integration tests and
``BENCH`` for the EXPERIMENTS.md numbers / pytest-benchmark runs.
"""
from __future__ import annotations

from dataclasses import dataclass, replace

import pandas as pd

from repro import DEG_TO_M
from repro import trajgen


@dataclass(frozen=True)
class DatasetCfg:
    """One synthetic dataset + its partitioning thresholds."""

    name: str  # 'porto' | 'geolife'
    n_traj: int
    n_steps: int
    seed: int
    eps_p_spatial: float  # deg, Eq. 7 threshold (paper: 0.1 / 5, rescaled)
    eps_p_auto: float  # Eq. 8 threshold on AR coefficients

    def load(self) -> pd.DataFrame:
        if self.name == "porto":
            return trajgen.porto_lite(
                n_traj=self.n_traj, n_steps=self.n_steps, seed=self.seed
            )
        if self.name == "geolife":
            return trajgen.geolife_lite(
                n_traj=self.n_traj, n_steps=self.n_steps, seed=self.seed
            )
        raise ValueError(f"unknown dataset {self.name!r}")


@dataclass(frozen=True)
class ExpConfig:
    """Global experiment parameters (paper Section 6.1 defaults)."""

    scale: str
    datasets: tuple[DatasetCfg, ...]
    n_queries: int
    eps1: float = 0.001  # ~111 m
    gs_m: float = 50.0  # CQC grid cell
    gc_m: float = 100.0  # index grid cell
    eps_s: float = 0.1  # index partition threshold
    eps_c: float = 0.5  # TRD dropping-rate threshold
    eps_d: float = 0.5  # ADR threshold
    trajstore_capacity: int = 256
    seed: int = 0

    @property
    def gs(self) -> float:
        return self.gs_m / DEG_TO_M

    @property
    def gc(self) -> float:
        return self.gc_m / DEG_TO_M

    def dataset(self, name: str) -> DatasetCfg:
        for d in self.datasets:
            if d.name == name:
                return d
        raise KeyError(name)


_PORTO_QUICK = DatasetCfg("porto", 60, 40, 7, 0.02, 0.3)
_GEOLIFE_QUICK = DatasetCfg("geolife", 24, 80, 11, 0.15, 0.3)
_PORTO_BENCH = DatasetCfg("porto", 600, 100, 7, 0.02, 0.3)
_GEOLIFE_BENCH = DatasetCfg("geolife", 150, 300, 11, 0.15, 0.3)

QUICK = ExpConfig(
    scale="quick", datasets=(_PORTO_QUICK, _GEOLIFE_QUICK), n_queries=60
)
BENCH = ExpConfig(
    scale="bench", datasets=(_PORTO_BENCH, _GEOLIFE_BENCH), n_queries=400
)

#: an even smaller config for the fastest smoke tests
TINY = ExpConfig(
    scale="tiny",
    datasets=(
        replace(_PORTO_QUICK, n_traj=24, n_steps=36),
        replace(_GEOLIFE_QUICK, n_traj=12, n_steps=40),
    ),
    n_queries=25,
)


def get(scale: str) -> ExpConfig:
    """Look up a config by scale name."""
    return {"tiny": TINY, "quick": QUICK, "bench": BENCH}[scale]
