"""Spark graph primitives vs local implementations and the DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.graph.local import bfs_hops, mioa_reach
from repro.graph.spark_ops import (
    bfs_spark,
    components_spark,
    degrees_spark,
    mioa_spark,
)
from repro.oracle import assert_equivalent

EDGES = pd.DataFrame(
    {"src": [0, 0, 1, 2, 5, 6], "dst": [1, 2, 3, 3, 6, 5]}
)  # two components: {0,1,2,3} and {5,6}
N = 7


@pytest.fixture(scope="module")
def edges_df(spark):
    return spark.createDataFrame(EDGES)


class TestDegrees:
    def test_matches_pandas(self, spark, edges_df):
        got = degrees_spark(edges_df).toPandas().set_index("user").sort_index()
        assert got.loc[0, "out_deg"] == 2 and got.loc[0, "in_deg"] == 0
        assert got.loc[3, "in_deg"] == 2 and got.loc[3, "out_deg"] == 0

    def test_oracle(self, spark, edges_df):
        got = degrees_spark(edges_df)
        assert_equivalent(
            got,
            """
            WITH o AS (SELECT src AS user, count(*) AS out_deg FROM e GROUP BY src),
                 i AS (SELECT dst AS user, count(*) AS in_deg  FROM e GROUP BY dst)
            SELECT coalesce(o.user, i.user) AS user,
                   coalesce(out_deg, 0) AS out_deg,
                   coalesce(in_deg, 0) AS in_deg
            FROM o FULL OUTER JOIN i ON o.user = i.user
            """,
            e=EDGES,
        )


class TestBfs:
    def test_matches_local(self, spark, edges_df):
        got = bfs_spark(edges_df, [0]).toPandas().set_index("user")["dist"]
        want = bfs_hops(EDGES["src"].to_numpy(), EDGES["dst"].to_numpy(), N, [0])
        for u in range(N):
            if want[u] < 0:
                assert u not in got.index
            else:
                assert got[u] == want[u]

    def test_oracle_recursive_cte(self, spark, edges_df):
        got = bfs_spark(edges_df, [0]).selectExpr(
            "user", "cast(dist as bigint) as dist"
        )
        assert_equivalent(
            got,
            """
            WITH RECURSIVE r(user, dist) AS (
              SELECT 0 AS user, 0 AS dist
              UNION ALL
              SELECT e.dst, r.dist + 1 FROM r JOIN e ON e.src = r.user
              WHERE r.dist < 10
            )
            SELECT user, min(dist) AS dist FROM r GROUP BY user
            """,
            e=EDGES,
        )

    def test_undirected_reaches_back(self, spark, edges_df):
        got = bfs_spark(edges_df, [3], undirected=True).toPandas()
        assert set(got["user"]) == {0, 1, 2, 3}


class TestComponents:
    def test_two_components(self, spark, edges_df):
        got = components_spark(edges_df).toPandas()
        by_user = got.set_index("user")["component"]
        assert by_user[0] == by_user[3] == 0
        assert by_user[5] == by_user[6] == 5
        assert by_user[0] != by_user[5]


class TestMioa:
    def test_matches_local(self, spark):
        g = np.random.default_rng(1)
        src = np.array([0, 0, 1, 1, 2, 3])
        dst = np.array([1, 2, 2, 3, 3, 4])
        prob = g.uniform(0.3, 0.9, 6)
        pdf = pd.DataFrame({"src": src, "dst": dst, "prob": prob})
        got = (
            mioa_spark(spark.createDataFrame(pdf), [0], 0.05)
            .toPandas()
            .set_index("user")["path_prob"]
        )
        want = mioa_reach(src, dst, prob, 5, [0], 0.05)
        for u in range(5):
            if want[u] == 0:
                assert u not in got.index
            else:
                assert got[u] == pytest.approx(want[u])
