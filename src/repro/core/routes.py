"""Upward-route sizes (paper Exp-7 / Table IV, and the Tur baseline).

The *upward-route size* of an edge is the number of upward-route
candidate followers it would have as an anchor — the size of the search
space Algorithm 3 actually visits. Table IV reports min / max / sum /
average over all edges; the Tur baseline samples anchors from the top
20% of edges by this size.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.followers import upward_candidates
from repro.truss.local import LocalGraph, TrussState


def route_size(g: LocalGraph, st: TrussState, x: int) -> int:
    """Number of upward-route candidates of edge ``x``."""
    cands, _reads = upward_candidates(g, st, x)
    return sum(len(c) for c in cands.values())


def route_sizes_spark(
    spark: SparkSession, g: LocalGraph, st: TrussState, parallelism: int | None = None
) -> np.ndarray:
    """Upward-route size of every edge, computed as a Spark fan-out.

    The graph and decomposition state ship to executors in the task
    closure (they are small relative to the per-edge traversal work);
    each task runs the local route kernel over its batch of edge ids.
    """
    m = g.m
    if m == 0:
        return np.zeros(0, dtype=np.int64)
    parts = parallelism or max(1, min(spark.sparkContext.defaultParallelism * 2, m // 64 + 1))
    ids = spark.createDataFrame(pd.DataFrame({"eid": np.arange(m)})).repartition(parts)

    def kernel(batches):
        for pdf in batches:
            out = [route_size(g, st, int(e)) for e in pdf["eid"]]
            yield pd.DataFrame({"eid": pdf["eid"], "size": out})

    res = ids.mapInPandas(kernel, schema="eid long, size long").toPandas()
    sizes = np.zeros(m, dtype=np.int64)
    sizes[res["eid"].to_numpy()] = res["size"].to_numpy()
    return sizes


def route_stats(sizes: np.ndarray) -> dict[str, float]:
    """Table IV row: min / max / sum / average of the route sizes."""
    return {
        "min": int(sizes.min()) if len(sizes) else 0,
        "max": int(sizes.max()) if len(sizes) else 0,
        "sum": int(sizes.sum()),
        "avg": float(sizes.mean()) if len(sizes) else 0.0,
    }
