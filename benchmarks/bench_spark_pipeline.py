"""Benchmark: the distributed PPQ build + STRQ over the coded DataFrame.

This is the dataflow path of DESIGN.md section 3 (partition assignment,
per-partition E-PQ via applyInPandas, query as a DataFrame filter).
"""
import math

from repro.spark.pipeline import assign_partitions, build_summary_spark
from repro.spark.query_exec import strq_spark
from repro.trajgen import to_spark


def test_distributed_build(benchmark, bench_cfg, spark):
    ds = bench_cfg.dataset("porto")
    points = ds.load()
    df = to_spark(spark, points).cache()
    df.count()  # materialise input outside the timer

    def build():
        with_pid = assign_partitions(
            spark, df, mode="S", eps_p=ds.eps_p_spatial, seed=bench_cfg.seed
        )
        coded, codebooks = build_summary_spark(
            with_pid, eps1=bench_cfg.eps1, gs=bench_cfg.gs, seed=bench_cfg.seed
        )
        return coded.count(), codebooks.count()

    n, v = benchmark.pedantic(build, rounds=1, iterations=1)
    assert n == len(points)
    assert v > 0


def test_distributed_strq(benchmark, bench_cfg, spark):
    ds = bench_cfg.dataset("porto")
    points = ds.load()
    df = to_spark(spark, points)
    with_pid = assign_partitions(
        spark, df, mode="S", eps_p=ds.eps_p_spatial, seed=bench_cfg.seed
    )
    coded, _ = build_summary_spark(
        with_pid, eps1=bench_cfg.eps1, gs=bench_cfg.gs, seed=bench_cfg.seed
    )
    coded = coded.cache()
    coded.count()
    qs = points.sample(n=10, random_state=1)
    radius = (math.sqrt(2) / 2) * bench_cfg.gs

    def run_queries():
        total = 0
        for q in qs.itertuples(index=False):
            total += strq_spark(
                coded, x=q.x, y=q.y, t=int(q.t), gc=bench_cfg.gc,
                local_search_radius=radius, verify=True,
            ).count()
        return total

    benchmark.pedantic(run_queries, rounds=1, iterations=1)
