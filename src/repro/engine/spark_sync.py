"""Synchronous (Eq. 1 / Jacobi) iterative engine on Spark DataFrames.

Classic Pregel-style superstep: join edge messages with source states,
aggregate per destination, apply F(·), measure the max state change, and
loop until it drops to the algorithm's tolerance. One Spark job chain
per round; states are ``localCheckpoint``ed to keep lineage flat.

Round-counting semantics match the reference engine exactly (the final
detection sweep is not counted), so tests can assert equal rounds.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.engine.algorithms import make_algo, effective_graph
from repro.engine.reference import RunResult
from repro.graphs.local import LocalGraph


def _static_frames(spark: SparkSession, g: LocalGraph, algo_name: str, source):
    algo = make_algo(algo_name)
    prep = algo.prepare(g, source)
    eg = effective_graph(g, prep)
    edges = spark.createDataFrame(
        pd.DataFrame({"src": eg.src, "dst": eg.dst, "param": prep.param})
    )
    fixed_vals = np.full(g.n, np.nan)
    for v, fv in prep.fixed.items():
        fixed_vals[v] = fv
    vertices = spark.createDataFrame(
        pd.DataFrame(
            {
                "vid": np.arange(g.n, dtype=np.int64),
                "base": prep.base,
                "init": prep.init,
                "fixed": fixed_vals,
            }
        )
    )
    return prep, edges, vertices


def run_sync_spark(
    spark: SparkSession,
    g: LocalGraph,
    algo_name: str,
    *,
    source: int | None = None,
    max_rounds: int = 300,
) -> RunResult:
    """Run Eq. 1 to convergence; returns rounds and final states."""
    t0 = time.perf_counter()
    prep, edges, vertices = _static_frames(spark, g, algo_name, source)
    edges = edges.localCheckpoint(eager=True)
    vertices = vertices.localCheckpoint(eager=True)

    states = vertices.select("vid", F.col("init").alias("val")).localCheckpoint(
        eager=True
    )
    deltas: list[float] = []
    rounds = 0
    converged = False
    for _ in range(max_rounds):
        msgs = edges.join(
            states.select(F.col("vid").alias("src"), F.col("val").alias("x_src")),
            "src",
        )
        if prep.kind == "sum":
            agg = msgs.groupBy("dst").agg(
                F.sum(F.col("x_src") * F.col("param")).alias("m")
            )
            new = (
                vertices.join(agg, vertices.vid == agg.dst, "left")
                .select(
                    "vid",
                    "base",
                    "fixed",
                    (F.col("base") + F.coalesce(F.col("m"), F.lit(0.0))).alias("nv"),
                )
            )
        elif prep.kind == "min":
            agg = msgs.groupBy("dst").agg(
                F.min(F.col("x_src") + F.col("param")).alias("m")
            )
            new = (
                vertices.join(agg, vertices.vid == agg.dst, "left")
                .join(states, "vid")
                .select(
                    "vid",
                    "fixed",
                    F.least(
                        F.col("val"), F.coalesce(F.col("m"), F.lit(float("inf")))
                    ).alias("nv"),
                )
            )
        elif prep.kind == "maxmin":
            agg = msgs.groupBy("dst").agg(
                F.max(F.least(F.col("x_src"), F.col("param"))).alias("m")
            )
            new = (
                vertices.join(agg, vertices.vid == agg.dst, "left")
                .join(states, "vid")
                .select(
                    "vid",
                    "fixed",
                    F.greatest(
                        F.col("val"), F.coalesce(F.col("m"), F.lit(float("-inf")))
                    ).alias("nv"),
                )
            )
        else:
            raise ValueError(prep.kind)
        new = new.select(
            "vid", F.coalesce(F.col("fixed"), F.col("nv")).alias("val")
        ).localCheckpoint(eager=True)
        d = (
            states.alias("o")
            .join(new.alias("n"), "vid")
            .select(
                F.when(F.col("o.val") == F.col("n.val"), F.lit(0.0))
                .otherwise(F.abs(F.col("o.val") - F.col("n.val")))
                .alias("d")
            )
            .agg(F.max("d"))
            .collect()[0][0]
        )
        states = new
        if d is None or d <= prep.tol:
            converged = True
            break
        deltas.append(float(d))
        rounds += 1

    pdf = states.toPandas().sort_values("vid")
    x = pdf["val"].to_numpy()
    return RunResult(rounds, x, converged, deltas, time.perf_counter() - t0)
