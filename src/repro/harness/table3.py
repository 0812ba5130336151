"""Table 3: MAE against different lengths of TPQ (10^3 m).

The same summaries as Table 2 (per-timestamp codebooks); one fixed set of
(traj_id, t) path-query starts is shared by all methods (the paper's
fairness rule), and for each l the accumulated deviation of the
reconstructed l-step path is reported in 10^3 m units.
"""
from __future__ import annotations

import pandas as pd

from repro.harness.common import ALL_METHODS, build_per_t_suite
from repro.harness.config import ExpConfig
from repro.queries.tpq import sample_path_queries, tpq_mae_km

PAPER_LENGTHS = (10, 20, 30, 40, 50)


def lengths_for(n_steps: int) -> list[int]:
    """The paper's l values that fit the dataset's timeline."""
    ls = [l for l in PAPER_LENGTHS if l <= max(1, n_steps // 2)]
    return ls or [max(1, n_steps // 4)]


def run(cfg: ExpConfig, *, methods: list[str] | None = None) -> pd.DataFrame:
    rows = []
    for ds in cfg.datasets:
        points = ds.load()
        ls = lengths_for(ds.n_steps)
        queries = sample_path_queries(
            points, cfg.n_queries, max_l=max(ls), seed=cfg.seed + 2
        )
        suite = build_per_t_suite(points, cfg, ds, methods=methods or ALL_METHODS)
        for name in methods or ALL_METHODS:
            mr = suite[name]
            row = {"dataset": ds.name, "method": name}
            for l in ls:
                row[f"l={l}"] = round(tpq_mae_km(mr.recon, queries, l), 4)
            rows.append(row)
    return pd.DataFrame(rows)
