"""Distributed PPR via truncated power iteration on Spark DataFrames.

Pregel-style: walk mass lives in a DataFrame ``(s, node, mass)`` (one row
group per source ``s``); one superstep multiplies the mass by
``(1-alpha) P`` — a join with the transition arcs followed by a groupBy —
and deposits ``alpha * mass`` into the PPR accumulator. A ``threshold``
prunes negligible mass to keep the frontier sparse (this is what makes the
all-sources mode, used by the STRAP baseline, tractable: it is the
DataFrame analogue of STRAP's delta-thresholded push).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.edgelist import SparkGraph


def ppr_from_sources(
    sg: SparkGraph,
    sources: list[int] | None,
    *,
    alpha: float = 0.15,
    iters: int = 20,
    threshold: float = 0.0,
    include_zero_hop: bool = True,
) -> DataFrame:
    """PPR rows for ``sources`` (all nodes when None) as ``(s, node, ppr)``.

    Computes ``sum over i=0..iters of alpha (1-alpha)^i P^i`` restricted to
    the source rows; with ``include_zero_hop=False`` the i=0 (diagonal
    alpha) term is skipped, yielding rows of the paper's Pi' plus the order
    i=iters tail — i.e. orders 1..iters.
    """
    spark = sg.spark
    trans = sg.transition_arcs().cache()
    trans.count()
    if sources is None:
        mass = spark.range(sg.n).select(
            F.col("id").alias("s"), F.col("id").alias("node"),
            F.lit(1.0).alias("mass"),
        )
    else:
        pdf = pd.DataFrame({"s": np.asarray(sources, dtype=np.int64)})
        mass = spark.createDataFrame(pdf).select(
            "s", F.col("s").alias("node"), F.lit(1.0).alias("mass")
        )
    mass = mass.localCheckpoint(eager=True)
    parts: list[DataFrame] = []
    if include_zero_hop:
        parts.append(
            mass.select("s", "node", (F.lit(alpha) * F.col("mass")).alias("p"))
        )
    for _ in range(1, iters + 1):
        stepped = (
            mass.join(trans, mass.node == trans.src)
            .select(
                "s",
                F.col("dst").alias("node"),
                (F.col("mass") * F.col("p") * F.lit(1.0 - alpha)).alias("mass"),
            )
            .groupBy("s", "node")
            .agg(F.sum("mass").alias("mass"))
        )
        if threshold > 0.0:
            stepped = stepped.filter(F.col("mass") > threshold)
        mass = stepped.localCheckpoint(eager=True)
        parts.append(
            mass.select("s", "node", (F.lit(alpha) * F.col("mass")).alias("p"))
        )
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    result = out.groupBy("s", "node").agg(F.sum("p").alias("ppr"))
    trans.unpersist()
    return result


def ppr_rows_numpy(
    sg: SparkGraph, sources: list[int], *, alpha: float = 0.15, iters: int = 20
) -> np.ndarray:
    """Collect PPR rows into a dense (len(sources), n) array (small use)."""
    pdf = ppr_from_sources(sg, sources, alpha=alpha, iters=iters).toPandas()
    index = {s: r for r, s in enumerate(sources)}
    out = np.zeros((len(sources), sg.n))
    for s, node, val in pdf.itertuples(index=False):
        out[index[s], int(node)] = val
    return out
