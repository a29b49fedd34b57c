"""Distributed truss decomposition over DataFrame iterative joins.

Synchronous-peeling semantics identical to the local kernel
(:func:`repro.truss.local.decompose`): at each ``k``, every round
removes *all* non-anchor edges whose support (recomputed among the
surviving edges by the triangle join) is at most ``k-2``; the round
index is the paper's layer ``l(e)``. Anchored edges are never removed.

The loop is a driver-side iteration over bulk DataFrame stages — the
idiom for bulk-synchronous graph analytics on Catalyst. Each round's
peeled batch is small and is collected into the result; the surviving
edge set is ``localCheckpoint``-ed to keep lineage bounded across the
many iterations.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.truss.triangles import support


def truss_decomposition(
    spark: SparkSession,
    edges: DataFrame,
    anchors: list[tuple[int, int]] | None = None,
) -> DataFrame:
    """Trussness ``t`` and layer ``l`` per edge, as ``(src, dst, t, l)``.

    ``anchors`` are canonical vertex pairs whose edges are retained in
    every truss; they are *excluded* from the output (their trussness
    is the +inf abstraction, not a finite number).
    """
    anchor_keys = {f"{u}-{v}" for u, v in (anchors or [])}
    alive = edges.select("src", "dst").localCheckpoint(eager=True)

    def non_anchor(df: DataFrame) -> DataFrame:
        if not anchor_keys:
            return df
        key = F.concat_ws("-", F.col("src"), F.col("dst"))
        return df.where(~key.isin(list(anchor_keys)))

    peeled: list[pd.DataFrame] = []
    k = 2
    while non_anchor(alive).limit(1).count() > 0:
        rnd = 0
        while True:
            sup = support(alive)
            batch = non_anchor(sup.where(F.col("sup") <= k - 2)).select(
                "src", "dst"
            )
            batch_pdf = batch.toPandas()
            if batch_pdf.empty:
                break
            rnd += 1
            batch_pdf["t"] = k
            batch_pdf["l"] = rnd
            peeled.append(batch_pdf)
            alive = alive.join(
                batch.hint("shuffle_hash"), on=["src", "dst"], how="left_anti"
            ).localCheckpoint(eager=True)
        k += 1

    schema = "src long, dst long, t long, l long"
    if not peeled:
        return spark.createDataFrame([], schema=schema)
    return spark.createDataFrame(pd.concat(peeled, ignore_index=True), schema=schema)
