"""Benchmark: reproduce Table 5 (summary build time vs spatial deviation).

Shares the memoized deviation sweep with Table 6 / Fig. 9 -- the first of
the three benchmarks to run pays the build cost.
"""
from benchmarks._util import run_once

from repro.harness import table5


def test_table5(benchmark, bench_cfg):
    run_once(benchmark, table5.run, bench_cfg)
