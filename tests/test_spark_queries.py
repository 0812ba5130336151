"""Integration tests for STRQ/TPQ as Spark DataFrame plans, oracle-checked."""
import math

import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.spark.pipeline import assign_partitions, build_summary_spark
from repro.spark.query_exec import strq_spark, tpq_spark
from repro.trajgen import to_spark

EPS1 = 0.001
GS = 0.00045
GC = 0.0009
RADIUS = (math.sqrt(2) / 2) * GS


@pytest.fixture(scope="module")
def coded(spark, porto_pts):
    df = to_spark(spark, porto_pts)
    with_pid = assign_partitions(spark, df, mode="S", eps_p=0.02, seed=0)
    c, _ = build_summary_spark(with_pid, eps1=EPS1, gs=GS, seed=0)
    return c.cache()


@pytest.fixture(scope="module")
def queries(porto_pts):
    return porto_pts.sample(n=8, random_state=1)[["traj_id", "t", "x", "y"]]


class TestSTRQSpark:
    def test_self_always_retrieved(self, coded, queries):
        for q in queries.itertuples(index=False):
            ids = strq_spark(
                coded, x=q.x, y=q.y, t=int(q.t), gc=GC,
                local_search_radius=RADIUS, verify=True,
            )
            got = {r.traj_id for r in ids.collect()}
            assert q.traj_id in got

    def test_matches_duckdb_plain(self, coded, queries):
        """The unverified candidate plan equals the same SQL in DuckDB."""
        q = queries.iloc[0]
        cx = math.floor(q.x / GC)
        cy = math.floor(q.y / GC)
        x0, x1 = cx * GC - RADIUS, (cx + 1) * GC + RADIUS
        y0, y1 = cy * GC - RADIUS, (cy + 1) * GC + RADIUS
        ids = strq_spark(
            coded, x=q.x, y=q.y, t=int(q.t), gc=GC, local_search_radius=RADIUS
        )
        assert_equivalent(
            ids,
            f"SELECT DISTINCT traj_id FROM coded WHERE t = {int(q.t)} "
            f"AND xrec >= {x0} AND xrec < {x1} "
            f"AND yrec >= {y0} AND yrec < {y1}",
            coded=coded,
        )

    def test_matches_duckdb_verified(self, coded, queries):
        q = queries.iloc[1]
        cx = math.floor(q.x / GC)
        cy = math.floor(q.y / GC)
        x0, x1 = cx * GC - RADIUS, (cx + 1) * GC + RADIUS
        y0, y1 = cy * GC - RADIUS, (cy + 1) * GC + RADIUS
        ids = strq_spark(
            coded, x=q.x, y=q.y, t=int(q.t), gc=GC,
            local_search_radius=RADIUS, verify=True,
        )
        assert_equivalent(
            ids,
            f"SELECT DISTINCT traj_id FROM coded WHERE t = {int(q.t)} "
            f"AND xrec >= {x0} AND xrec < {x1} AND yrec >= {y0} AND yrec < {y1} "
            f"AND floor(x / {GC}) = {cx} AND floor(y / {GC}) = {cy}",
            coded=coded,
        )

    def test_verified_equals_ground_truth(self, coded, queries, porto_pts):
        """Verified STRQ (local search + verification) returns exactly the
        trajectories whose true position is in the query cell."""
        for q in queries.itertuples(index=False):
            ids = strq_spark(
                coded, x=q.x, y=q.y, t=int(q.t), gc=GC,
                local_search_radius=RADIUS, verify=True,
            )
            got = {r.traj_id for r in ids.collect()}
            frame = porto_pts[porto_pts.t == q.t]
            cx, cy = math.floor(q.x / GC), math.floor(q.y / GC)
            truth = {
                int(r.traj_id)
                for r in frame.itertuples(index=False)
                if math.floor(r.x / GC) == cx and math.floor(r.y / GC) == cy
            }
            assert got == truth


class TestTPQSpark:
    def test_window_bounds(self, coded, queries):
        q = queries.iloc[0]
        ids = strq_spark(
            coded, x=q.x, y=q.y, t=int(q.t), gc=GC,
            local_search_radius=RADIUS, verify=True,
        )
        path = tpq_spark(coded, ids, t=int(q.t), l=5).toPandas()
        if len(path):
            assert path.t.min() > q.t
            assert path.t.max() <= q.t + 5

    def test_matches_duckdb(self, coded, queries):
        q = queries.iloc[2]
        ids = strq_spark(
            coded, x=q.x, y=q.y, t=int(q.t), gc=GC,
            local_search_radius=RADIUS, verify=True,
        ).cache()
        path = tpq_spark(coded, ids, t=int(q.t), l=6)
        assert_equivalent(
            path,
            f"SELECT c.traj_id, c.t, c.xrec AS px, c.yrec AS py "
            f"FROM coded c JOIN ids i ON c.traj_id = i.traj_id "
            f"WHERE c.t > {int(q.t)} AND c.t <= {int(q.t) + 6}",
            coded=coded,
            ids=ids,
        )

    def test_path_lengths_per_trajectory(self, coded, queries, porto_pts):
        q = queries.iloc[3]
        ids = strq_spark(
            coded, x=q.x, y=q.y, t=int(q.t), gc=GC,
            local_search_radius=RADIUS, verify=True,
        )
        path = tpq_spark(coded, ids, t=int(q.t), l=4).toPandas()
        for tid, grp in path.groupby("traj_id"):
            assert len(grp) <= 4
