"""Spark DataFrame graph algorithms (the GraphX-equivalent layer).

PySpark cannot reach GraphX, so the classic Pregel patterns are
expressed as iterative DataFrame joins with ``localCheckpoint`` to cut
lineage — the standard Spark-SQL formulation of bulk-synchronous graph
processing. Each algorithm mirrors a local function in
:mod:`repro.graph.local`; tests assert agreement and oracle-check
against DuckDB recursive CTEs.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

_CHECKPOINT_EVERY = 4


def degrees_spark(edges: DataFrame) -> DataFrame:
    """Out/in degree per user: ``(user, out_deg, in_deg)``.

    Users appearing only as sources (or only as destinations) get 0 for
    the missing side; isolated users are absent (degree-0 rows carry no
    information for the cost model, which is the consumer).
    """
    out_d = edges.groupBy(F.col("src").alias("user")).agg(
        F.count(F.lit(1)).alias("out_deg")
    )
    in_d = edges.groupBy(F.col("dst").alias("user")).agg(
        F.count(F.lit(1)).alias("in_deg")
    )
    return (
        out_d.join(in_d, on="user", how="outer")
        .fillna(0, subset=["out_deg", "in_deg"])
        .select("user", "out_deg", "in_deg")
    )


def bfs_spark(
    edges: DataFrame,
    sources,
    *,
    undirected: bool = False,
    max_hops: int = 64,
) -> DataFrame:
    """Multi-source BFS levels: ``(user, dist)`` for reachable users.

    Bulk-synchronous frontier expansion: each round joins the frontier
    with the edge list, anti-joins already-visited users, and unions
    into the visited set. ``sources`` is a list of user ids.
    """
    spark = edges.sparkSession
    e = edges.select("src", "dst")
    if undirected:
        e = e.unionByName(edges.select(F.col("dst").alias("src"), F.col("src").alias("dst")))
    e = e.distinct().cache()
    visited = spark.createDataFrame([(int(s), 0) for s in sources], "user long, dist int")
    frontier = visited
    for hop in range(1, max_hops + 1):
        nxt = (
            frontier.join(e, on=frontier["user"] == e["src"])
            .select(F.col("dst").alias("user"))
            .distinct()
            .join(visited.select("user"), on="user", how="left_anti")
            .withColumn("dist", F.lit(hop))
        )
        nxt = nxt.localCheckpoint(eager=True)
        if nxt.isEmpty():
            break
        visited = visited.unionByName(nxt)
        if hop % _CHECKPOINT_EVERY == 0:
            visited = visited.localCheckpoint(eager=True)
        frontier = nxt
    e.unpersist()
    return visited


def components_spark(edges: DataFrame, *, max_rounds: int = 64) -> DataFrame:
    """Connected components (undirected): ``(user, component)``.

    Iterative min-label propagation: every node repeatedly adopts the
    smallest label in its closed neighbourhood until fixpoint. The
    component id is the minimum member id.
    """
    und = (
        edges.select("src", "dst")
        .unionByName(edges.select(F.col("dst").alias("src"), F.col("src").alias("dst")))
        .distinct()
        .cache()
    )
    labels = (
        und.select(F.col("src").alias("user"))
        .union(und.select(F.col("dst").alias("user")))
        .distinct()
        .withColumn("component", F.col("user"))
    )
    for r in range(max_rounds):
        neigh_min = (
            und.join(labels, on=und["src"] == labels["user"])
            .groupBy(F.col("dst").alias("user"))
            .agg(F.min("component").alias("nbr_min"))
        )
        new_labels = (
            labels.join(neigh_min, on="user", how="left")
            .withColumn(
                "new_component",
                F.least(F.col("component"), F.coalesce(F.col("nbr_min"), F.col("component"))),
            )
        )
        changed = new_labels.filter(F.col("new_component") < F.col("component")).isEmpty()
        labels = new_labels.select(
            "user", F.col("new_component").alias("component")
        ).localCheckpoint(eager=True)
        if changed:
            break
    und.unpersist()
    return labels


def mioa_spark(
    edges_with_prob: DataFrame,
    sources,
    threshold: float,
    *,
    max_rounds: int = 32,
) -> DataFrame:
    """Maximum-influence reachability: ``(user, path_prob)``.

    Bellman–Ford-style relaxation of best path probability (product of
    edge ``prob``), pruned below ``threshold``. Matches
    :func:`repro.graph.local.mioa_reach` (sources get prob 1.0).
    """
    spark = edges_with_prob.sparkSession
    e = edges_with_prob.select("src", "dst", "prob").cache()
    best = spark.createDataFrame(
        [(int(s), 1.0) for s in sources], "user long, path_prob double"
    )
    frontier = best
    for r in range(max_rounds):
        cand = (
            frontier.join(e, on=frontier["user"] == e["src"])
            .select(
                F.col("dst").alias("user"),
                (F.col("path_prob") * F.col("prob")).alias("cand_prob"),
            )
            .filter(F.col("cand_prob") >= threshold)
            .groupBy("user")
            .agg(F.max("cand_prob").alias("cand_prob"))
        )
        improved = (
            cand.join(best, on="user", how="left")
            .filter(
                F.col("path_prob").isNull() | (F.col("cand_prob") > F.col("path_prob"))
            )
            .select("user", F.col("cand_prob").alias("path_prob"))
            .localCheckpoint(eager=True)
        )
        if improved.isEmpty():
            break
        best = (
            best.join(improved.select("user"), on="user", how="left_anti")
            .unionByName(improved)
            .localCheckpoint(eager=True)
        )
        frontier = improved
    e.unpersist()
    return best
