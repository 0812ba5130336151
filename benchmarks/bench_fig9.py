"""Benchmark: reproduce Figure 9's compression ratios as a table."""
from benchmarks._util import run_once

from repro.harness import fig9


def test_fig9(benchmark, bench_cfg):
    run_once(benchmark, fig9.run, bench_cfg)
