"""Table 4: average ratio of trajectories visited + MAE vs codebook size.

Every method gets 2**bits codewords per timestamp (bits in 5..9). The
visited ratio is the exact-match candidate-set fraction: every trajectory
whose reconstruction lies within the method's worst-case error radius of
the query point must be visited (that radius is the smallest one that
still guarantees the exact answer). For CQC methods the radius is the
Lemma-3 constant, so their ratio does not move with the codebook size --
the paper's headline observation. TrajStore is excluded (as in the paper:
its per-cell summaries cannot be sized per-timestamp fairly).
"""
from __future__ import annotations

import pandas as pd

from repro.harness.common import NO_TRAJSTORE, build_fixed_bits_suite
from repro.harness.config import ExpConfig
from repro.queries.exact import visited_ratio
from repro.queries.strq import sample_queries

BITS = (5, 6, 7, 8, 9)


def _t4_dataset(cfg: ExpConfig, ds):
    """Table 4 needs many active trajectories *per timestamp* (up to 2**9
    codewords must stay well below the per-timestep point count for the
    budget sweep to bite). At bench scale the datasets are re-shaped
    wider and shorter; test scales use them as-is."""
    from dataclasses import replace

    if cfg.scale != "bench":
        return ds
    return replace(ds, n_traj=ds.n_traj * 4, n_steps=max(30, ds.n_steps // 2))


def run(cfg: ExpConfig, *, methods: list[str] | None = None, bits=BITS) -> pd.DataFrame:
    methods = methods or NO_TRAJSTORE
    rows = []
    for ds_base in cfg.datasets:
        ds = _t4_dataset(cfg, ds_base)
        points = ds.load()
        queries = sample_queries(points, cfg.n_queries, seed=cfg.seed + 3)
        per_bits = {}
        for b in bits:
            per_bits[b] = build_fixed_bits_suite(points, cfg, ds, b, methods=methods)
        for name in methods:
            row_ratio = {"dataset": ds.name, "method": name, "measure": "ratio"}
            row_mae = {"dataset": ds.name, "method": name, "measure": "mae_m"}
            for b in bits:
                mr = per_bits[b][name]
                radius = mr.local_radius_deg if mr.verified else None
                row_ratio[f"{b}bits"] = round(
                    visited_ratio(mr.recon, queries, radius_deg=radius), 4
                )
                row_mae[f"{b}bits"] = round(mr.mae_m(), 2)
            rows.append(row_ratio)
            rows.append(row_mae)
    return pd.DataFrame(rows)
