"""spark-submit entrypoint for the distributed PPQ build + queries.

Demonstrates the dataflow of DESIGN.md section 3: lift the trajectory
points into a DataFrame, assign trajectory-level partitions, build the
PPQ summary per partition with applyInPandas, and answer a few STRQ/TPQ
queries with DataFrame filters/joins over the coded points.
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["tiny", "quick", "bench"])
    ap.add_argument("--mode", default="S", choices=["S", "A"])
    args = ap.parse_args()

    from repro.harness import config
    from repro.spark.pipeline import (
        assign_partitions,
        build_summary_spark,
        mae_m_spark,
    )
    from repro.spark.query_exec import strq_spark, tpq_spark
    from repro.trajgen import to_spark

    cfg = config.get(args.scale)
    ds = cfg.dataset("porto")
    points = ds.load()

    spark = (
        SparkSession.builder.appName("ppq-trajectory-distributed-build")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    try:
        df = to_spark(spark, points)
        eps_p = ds.eps_p_spatial if args.mode == "S" else ds.eps_p_auto
        with_pid = assign_partitions(
            spark, df, mode=args.mode, eps_p=eps_p, seed=cfg.seed
        )
        coded, codebooks = build_summary_spark(
            with_pid, eps1=cfg.eps1, gs=cfg.gs, seed=cfg.seed
        )
        n = coded.count()
        v = codebooks.count()
        print(f"coded points: {n}, codewords: {v}, MAE: {mae_m_spark(coded):.2f} m")

        q = points.sample(n=1, random_state=cfg.seed).iloc[0]
        ids = strq_spark(
            coded,
            x=float(q.x),
            y=float(q.y),
            t=int(q.t),
            gc=cfg.gc,
            local_search_radius=0.7071 * cfg.gs,
            verify=True,
        )
        print(f"STRQ({q.x:.4f},{q.y:.4f},t={int(q.t)}):")
        ids.show(20, truncate=False)
        tpq_spark(coded, ids, t=int(q.t), l=10).show(20, truncate=False)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
