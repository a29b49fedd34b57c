"""Edge-list canonicalisation and Spark <-> pandas conversion.

Every graph in this repo is an unweighted, undirected simple graph
represented as an edge list with integer vertex ids. The canonical form
used everywhere is:

* columns ``src``, ``dst`` (int64), with ``src < dst`` on every row;
* no self loops, no duplicate rows;
* rows sorted by ``(src, dst)`` so that the *edge id* (the row position
  in the canonical frame) is a deterministic function of the edge set.

Edge ids are load-bearing: the paper's tree structure keys nodes by the
smallest edge id, and our greedy tie-breaks on edge id, so determinism
here makes BASE / BASE+ / GAS produce byte-identical anchor sets.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def canonical_edges(pdf: pd.DataFrame) -> pd.DataFrame:
    """Return the canonical (sorted, deduped, src<dst) edge frame.

    Accepts any frame with ``src``/``dst`` columns; self loops are
    dropped and both orientations of the same edge collapse to one row.
    """
    src = pdf["src"].to_numpy(dtype=np.int64)
    dst = pdf["dst"].to_numpy(dtype=np.int64)
    lo = np.minimum(src, dst)
    hi = np.maximum(src, dst)
    keep = lo != hi
    out = pd.DataFrame({"src": lo[keep], "dst": hi[keep]})
    out = out.drop_duplicates().sort_values(["src", "dst"]).reset_index(drop=True)
    return out


def spark_edges(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Lift a canonical pandas edge frame into a Spark DataFrame."""
    return spark.createDataFrame(canonical_edges(pdf))


def canonicalize_spark(edges: DataFrame) -> DataFrame:
    """Canonicalise a Spark edge DataFrame (src<dst, distinct, no loops)."""
    return (
        edges.select(
            F.least("src", "dst").alias("src"), F.greatest("src", "dst").alias("dst")
        )
        .where(F.col("src") != F.col("dst"))
        .distinct()
    )


def edge_key(u: int, v: int) -> tuple[int, int]:
    """The canonical (min, max) key of an undirected edge."""
    return (u, v) if u < v else (v, u)
