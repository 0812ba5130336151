"""Table 2: quality of summaries and STRQ evaluation.

Per dataset and method: the summary MAE (meters) plus mean precision and
recall of spatio-temporal range queries answered from the summary. PPQ-A
and PPQ-S use the CQC local-search + verification path (which is what
makes their precision/recall 1.000 in the paper); the other methods
answer directly from their reconstructed positions.
"""
from __future__ import annotations

import pandas as pd

from repro.harness.common import ALL_METHODS, build_per_t_suite
from repro.harness.config import ExpConfig
from repro.queries.strq import evaluate_strq, sample_queries

COLUMNS = ["dataset", "method", "mae_m", "precision", "recall"]


def run(cfg: ExpConfig, *, methods: list[str] | None = None) -> pd.DataFrame:
    """Reproduce Table 2's rows at the given config scale."""
    rows = []
    for ds in cfg.datasets:
        points = ds.load()
        queries = sample_queries(points, cfg.n_queries, seed=cfg.seed + 1)
        suite = build_per_t_suite(points, cfg, ds, methods=methods or ALL_METHODS)
        for name in methods or ALL_METHODS:
            mr = suite[name]
            p, r = evaluate_strq(
                mr.recon,
                queries,
                gc=cfg.gc,
                local_search_radius=mr.local_radius_deg,
                verify=mr.verified,
            )
            rows.append(
                {
                    "dataset": ds.name,
                    "method": name,
                    "mae_m": round(mr.mae_m(), 2),
                    "precision": round(p, 3),
                    "recall": round(r, 3),
                }
            )
    return pd.DataFrame(rows, columns=COLUMNS)
