"""Shared (memoized) deviation sweep used by Tables 5/6 and Fig. 9.

Building every method's error-bounded summary at five deviations is the
expensive part of the evaluation; Tables 5 (time), 6 (codewords) and the
Fig.-9 compression-ratio harness all read from one sweep.
"""
from __future__ import annotations

from functools import lru_cache

from repro.harness.common import ALL_METHODS, MethodResult, build_bounded_suite
from repro.harness.config import ExpConfig

DEVIATIONS_M = (200.0, 400.0, 600.0, 800.0, 1000.0)


@lru_cache(maxsize=4)
def bounded_sweep(
    cfg: ExpConfig, deviations: tuple[float, ...] = DEVIATIONS_M
) -> dict[tuple[str, float], dict[str, MethodResult]]:
    """{(dataset, deviation_m): {method: MethodResult}} for the config."""
    out: dict[tuple[str, float], dict[str, MethodResult]] = {}
    for ds in cfg.datasets:
        points = ds.load()
        for dev in deviations:
            out[(ds.name, dev)] = build_bounded_suite(
                points, cfg, ds, dev, methods=ALL_METHODS
            )
    return out
