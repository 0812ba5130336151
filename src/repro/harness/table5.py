"""Table 5: summary build time (seconds) vs target spatial deviation."""
from __future__ import annotations

import pandas as pd

from repro.harness.common import ALL_METHODS
from repro.harness.config import ExpConfig
from repro.harness.sweep import DEVIATIONS_M, bounded_sweep


def run(cfg: ExpConfig, *, deviations=DEVIATIONS_M) -> pd.DataFrame:
    sweep = bounded_sweep(cfg, tuple(deviations))
    rows = []
    for ds in cfg.datasets:
        for name in ALL_METHODS:
            row = {"dataset": ds.name, "method": name}
            for dev in deviations:
                row[f"{int(dev)}m"] = round(sweep[(ds.name, dev)][name].build_seconds, 3)
            rows.append(row)
    return pd.DataFrame(rows)
