"""PageRank, BFS and Connected Components on the gasx engine — the three
workloads of the paper's Table 4 (communication-heavy, frontier-driven,
and shrinking-active-set respectively)."""
from __future__ import annotations

import time
from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .engine import symmetrize, two_stage_agg, vertices


@dataclass
class RunStats:
    """Outcome of one gasx algorithm run."""

    iterations: int
    comm_rows: int  # Σ over iterations of stage-2 partial rows
    wall_s: float


def pagerank(assignment: DataFrame, *, n_iter: int = 10, beta: float = 0.85) -> tuple[DataFrame, RunStats]:
    """GraphX-style PageRank on the undirected graph: every vertex
    active every iteration (the paper's communication-bound workload).
    Returns (DataFrame(v, rank), stats). rank = 0.15 + 0.85·Σ in-contrib,
    unnormalized, as in GraphX's staticPageRank."""
    t0 = time.perf_counter()
    sym = symmetrize(assignment)
    outdeg = sym.groupBy("src").agg(F.count("*").alias("outdeg"))
    sym_deg = sym.join(outdeg, "src").localCheckpoint()
    verts = vertices(assignment).localCheckpoint()
    ranks = verts.withColumn("rank", F.lit(1.0))
    comm = 0
    for _ in range(n_iter):
        msgs = sym_deg.join(ranks, sym_deg.src == ranks.v).select(
            "pid", "dst", (F.col("rank") / F.col("outdeg")).alias("contrib")
        )
        total, rows = two_stage_agg(msgs, "contrib", "sum")
        comm += rows
        ranks = (
            verts.join(total, verts.v == total.dst, "left")
            .select(
                "v",
                (
                    F.lit(1 - beta) + F.lit(beta) * F.coalesce("contrib", F.lit(0.0))
                ).alias("rank"),
            )
            .localCheckpoint()
        )
    return ranks, RunStats(n_iter, comm, time.perf_counter() - t0)


def bfs(assignment: DataFrame, *, source: int, max_iter: int = 50) -> tuple[DataFrame, RunStats]:
    """Level-synchronous BFS from ``source``. Returns
    (DataFrame(v, dist) over *reached* vertices, stats)."""
    t0 = time.perf_counter()
    sym = symmetrize(assignment).localCheckpoint()
    spark = assignment.sparkSession
    dist = spark.createDataFrame([(source, 0)], ["v", "dist"]).localCheckpoint()
    frontier = dist
    comm = 0
    it = 0
    while it < max_iter:
        it += 1
        msgs = sym.join(frontier, sym.src == frontier.v).select(
            "pid", "dst", (F.col("dist") + 1).alias("cand")
        )
        total, rows = two_stage_agg(msgs, "cand", "min")
        comm += rows
        new = (
            total.join(dist, total.dst == dist.v, "left_anti")
            .select(F.col("dst").alias("v"), F.col("cand").alias("dist"))
            .localCheckpoint()
        )
        if new.count() == 0:
            break
        dist = dist.unionAll(new).localCheckpoint()
        frontier = new
    return dist, RunStats(it, comm, time.perf_counter() - t0)


def connected_components(assignment: DataFrame, *, max_iter: int = 50) -> tuple[DataFrame, RunStats]:
    """Min-label propagation until fixpoint (or ``max_iter``). Returns
    (DataFrame(v, lbl), stats); vertices of one component share the
    minimum vertex id of the component."""
    t0 = time.perf_counter()
    sym = symmetrize(assignment).localCheckpoint()
    labels = vertices(assignment).withColumn("lbl", F.col("v")).localCheckpoint()
    comm = 0
    it = 0
    while it < max_iter:
        it += 1
        msgs = sym.join(labels, sym.src == labels.v).select(
            "pid", "dst", F.col("lbl").alias("cand")
        )
        total, rows = two_stage_agg(msgs, "cand", "min")
        comm += rows
        merged = labels.join(total, labels.v == total.dst, "left").select(
            "v",
            F.least(F.col("lbl"), F.coalesce("cand", F.col("lbl"))).alias("new_lbl"),
            F.col("lbl").alias("old_lbl"),
        ).localCheckpoint()
        changed = merged.where(F.col("new_lbl") < F.col("old_lbl")).count()
        labels = merged.select("v", F.col("new_lbl").alias("lbl")).localCheckpoint()
        if changed == 0:
            break
    return labels, RunStats(it, comm, time.perf_counter() - t0)
