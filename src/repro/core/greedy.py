"""Greedy anchor selection: BASE, BASE+ and GAS (paper Algorithms 2 & 6).

All three methods run the same outer greedy loop — in each of ``b``
rounds, evaluate the trussness gain of every non-anchored candidate
edge and anchor the best (ties broken by smallest edge id, so all
methods produce identical anchor sets) — and differ only in how a
candidate is evaluated:

* **BASE** re-runs a full truss decomposition of ``G_{A∪{e}}`` per
  candidate (Algorithm 2): ``O(m^{1.5})`` per candidate.
* **BASE+** evaluates a candidate with the upward-route + support-check
  follower kernel (Algorithm 3): only the route neighbourhood is
  visited.
* **GAS** additionally caches each candidate's follower result together
  with its *read-set* and recomputes only candidates whose read edges
  changed ``(t, l, anchored)`` state since they were computed — an
  exact-by-construction realisation of Algorithm 6's reuse rule. The
  paper's truss-component tree is rebuilt each round to report the
  FR / PR / NR reuse statistics of Exp-8 (see DESIGN.md for why the
  executable reuse test is the read-set, not the tree).

Candidate evaluation is the hot loop and is *embarrassingly parallel
across candidates*, so it fans out over Spark: candidate edge ids are a
DataFrame, the (small) graph + decomposition state ride in the task
closure, and ``mapInPandas`` runs the local kernel per batch. Below
``spark_threshold`` candidates the driver evaluates directly — task
overhead would dominate.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.followers import FollowerResult, get_followers
from repro.core.tree import build_tree, classify_reuse, expired_nodes, node_signature
from repro.truss.local import LocalGraph, TrussState, decompose


@dataclass
class RoundStats:
    """Per-round diagnostics of one greedy iteration."""

    best: int
    gain: int
    evaluated: int
    reused: int
    seconds: float
    reuse_classes: dict[str, int] = field(default_factory=dict)


@dataclass
class GreedyResult:
    """Outcome of a greedy run."""

    method: str
    anchors: list[int]
    rounds: list[RoundStats]
    total_gain: int
    seconds: float

    @property
    def anchor_edges(self) -> list[tuple[int, int]]:
        """Anchors as vertex pairs (requires ``g`` used at run time)."""
        return self._edges  # set by run_greedy

    _edges: list[tuple[int, int]] = field(default_factory=list)


def _eval_followers_local(
    g: LocalGraph, st: TrussState, cand: list[int]
) -> dict[int, FollowerResult]:
    return {e: get_followers(g, st, e) for e in cand}


def _eval_followers_spark(
    spark: SparkSession, g: LocalGraph, st: TrussState, cand: list[int]
) -> dict[int, FollowerResult]:
    """Fan the follower kernel out over Spark tasks.

    Follower / read sets come back as comma-joined id strings — scalar
    columns keep the Arrow exchange trivial and the result is tiny.
    """
    parts = max(1, min(spark.sparkContext.defaultParallelism * 2, len(cand) // 32 + 1))
    ids = spark.createDataFrame(pd.DataFrame({"eid": cand})).repartition(parts)

    def kernel(batches):
        for pdf in batches:
            rows = []
            for e in pdf["eid"]:
                fr = get_followers(g, st, int(e))
                rows.append(
                    (
                        int(e),
                        ",".join(map(str, sorted(fr.followers))),
                        ",".join(map(str, sorted(fr.reads))),
                        ",".join(map(str, sorted(fr.candidates))),
                    )
                )
            yield pd.DataFrame(
                rows, columns=["eid", "followers", "reads", "cands"]
            )

    res = ids.mapInPandas(
        kernel, schema="eid long, followers string, reads string, cands string"
    ).toPandas()
    out: dict[int, FollowerResult] = {}

    def ids_of(s: str) -> frozenset[int]:
        return frozenset(int(v) for v in s.split(",")) if s else frozenset()

    for row in res.itertuples(index=False):
        out[int(row.eid)] = FollowerResult(
            x=int(row.eid),
            followers=ids_of(row.followers),
            candidates=ids_of(row.cands),
            reads=ids_of(row.reads),
        )
    return out


def _eval_gain_by_decomp_spark(
    spark: SparkSession,
    g: LocalGraph,
    st: TrussState,
    anchors: frozenset[int],
    cand: list[int],
) -> dict[int, int]:
    """BASE candidate evaluation: full decomposition per candidate.

    Each Spark task runs ``decompose(G_{A∪{e}})`` for its batch and
    returns the candidate's trussness gain against ``st``.
    """
    parts = max(1, min(spark.sparkContext.defaultParallelism * 4, len(cand)))
    ids = spark.createDataFrame(pd.DataFrame({"eid": cand})).repartition(parts)
    base_t = st.t

    def kernel(batches):
        for pdf in batches:
            rows = []
            for e in pdf["eid"]:
                e = int(e)
                after = decompose(g, anchors | {e})
                gain = 0
                for i in range(g.m):
                    if i == e or i in anchors:
                        continue
                    gain += int(after.t[i]) - int(base_t[i])
                rows.append((e, gain))
            yield pd.DataFrame(rows, columns=["eid", "gain"])

    res = ids.mapInPandas(kernel, schema="eid long, gain long").toPandas()
    return {int(r.eid): int(r.gain) for r in res.itertuples(index=False)}


def _pick_best(gains: dict[int, int]) -> tuple[int, int]:
    """Argmax gain, smallest edge id on ties — shared by all methods."""
    best = min(gains, key=lambda e: (-gains[e], e))
    return best, gains[best]


def run_greedy(
    spark: SparkSession,
    g: LocalGraph,
    b: int,
    method: str = "gas",
    spark_threshold: int = 512,
    track_tree: bool = False,
) -> GreedyResult:
    """Run ``b`` rounds of greedy anchoring with the given method.

    ``method`` in ``{"base", "base+", "gas"}``. ``spark_threshold`` is
    the candidate count above which evaluation fans out to Spark;
    pass 0 to force the distributed path (tests do). ``track_tree``
    additionally rebuilds the truss component tree per round and logs
    the FR/PR/NR reuse classes (costs one tree build per round).
    """
    if method not in {"base", "base+", "gas"}:
        raise ValueError(f"unknown method {method!r}")
    t_start = time.perf_counter()
    anchors: set[int] = set()
    st = decompose(g, frozenset())
    st0_t = st.t.copy()
    cache: dict[int, FollowerResult] = {}
    rounds: list[RoundStats] = []
    tree = build_tree(g, st) if track_tree else None
    sig = node_signature(tree, st) if track_tree else None

    for _ in range(min(b, g.m)):
        r_start = time.perf_counter()
        cand = [e for e in range(g.m) if e not in anchors]
        if not cand:
            break
        if method == "base":
            gains = (
                _eval_gain_by_decomp_spark(spark, g, st, frozenset(anchors), cand)
                if len(cand) >= spark_threshold
                else {
                    e: len(get_followers_by_decomp(g, st, frozenset(anchors), e))
                    for e in cand
                }
            )
            evaluated, reused = len(cand), 0
        else:
            if method == "gas":
                stale = [e for e in cand if e not in cache]
            else:
                stale = cand
                cache.clear()
            fresh = (
                _eval_followers_spark(spark, g, st, stale)
                if len(stale) >= spark_threshold
                else _eval_followers_local(g, st, stale)
            )
            cache.update(fresh)
            gains = {e: cache[e].gain for e in cand}
            evaluated, reused = len(stale), len(cand) - len(stale)

        best, gain = _pick_best(gains)
        anchors.add(best)
        prev_t, prev_l = st.t.copy(), st.layer.copy()
        st = decompose(g, frozenset(anchors))

        reuse_classes: dict[str, int] = {}
        if track_tree:
            new_tree = build_tree(g, st)
            new_sig = node_signature(new_tree, st)
            es = expired_nodes(sig, new_sig)
            cls = classify_reuse(g, st, new_tree, es)
            for v in cls.values():
                reuse_classes[v] = reuse_classes.get(v, 0) + 1
            tree, sig = new_tree, new_sig

        if method == "gas":
            changed = {
                e
                for e in range(g.m)
                if int(st.t[e]) != int(prev_t[e]) or int(st.layer[e]) != int(prev_l[e])
            }
            changed.add(best)
            cache.pop(best, None)
            if changed:
                for e in [e for e, fr in cache.items() if fr.reads & changed]:
                    del cache[e]
        rounds.append(
            RoundStats(
                best=best,
                gain=gain,
                evaluated=evaluated,
                reused=reused,
                seconds=time.perf_counter() - r_start,
                reuse_classes=reuse_classes,
            )
        )

    total_gain = int(
        sum(
            int(st.t[e]) - int(st0_t[e])
            for e in range(g.m)
            if e not in anchors
        )
    )
    res = GreedyResult(
        method=method,
        anchors=[r.best for r in rounds],
        rounds=rounds,
        total_gain=total_gain,
        seconds=time.perf_counter() - t_start,
    )
    res._edges = [g.edge(e) for e in res.anchors]
    return res


def get_followers_by_decomp(
    g: LocalGraph, st: TrussState, anchors: frozenset[int], x: int
) -> frozenset[int]:
    """BASE's candidate evaluation: followers via full re-decomposition."""
    after = decompose(g, anchors | {x})
    return frozenset(
        e
        for e in range(g.m)
        if e != x
        and e not in anchors
        and int(after.t[e]) > int(st.t[e])
    )
