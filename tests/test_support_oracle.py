"""Distributed triangle/support primitives vs the DuckDB oracle.

The SQL side recomputes triangles and support from the raw edge table,
so a wrong join orientation or a lost shuffle row in the Spark
implementation fails the diff — not just "it ran".
"""
import pytest

from repro.graphs.edges import spark_edges
from repro.graphs.gen import community_graph, random_graph
from repro.graphs.toys import truss_ladder, two_triangles
from repro.oracle import assert_equivalent
from repro.truss.reference import support_naive
from repro.truss.triangles import support, triangles

_TRI_SQL = """
WITH tri AS (
  SELECT e1.src AS a, e1.dst AS b, e2.dst AS c
  FROM edges e1
  JOIN edges e2 ON e1.dst = e2.src
  JOIN edges e3 ON e3.src = e1.src AND e3.dst = e2.dst
)
"""

SUPPORT_SQL = (
    _TRI_SQL
    + """
, sides AS (
  SELECT a AS src, b AS dst FROM tri
  UNION ALL SELECT b, c FROM tri
  UNION ALL SELECT a, c FROM tri
), cnt AS (
  SELECT src, dst, count(*) AS sup FROM sides GROUP BY src, dst
)
SELECT e.src AS src, e.dst AS dst, CAST(coalesce(cnt.sup, 0) AS BIGINT) AS sup
FROM edges e LEFT JOIN cnt ON e.src = cnt.src AND e.dst = cnt.dst
"""
)

TRIANGLES_SQL = _TRI_SQL + "SELECT a, b, c FROM tri"


def _graphs():
    yield "two_triangles", two_triangles()
    yield "ladder", truss_ladder()
    for seed in range(3):
        yield f"rand{seed}", random_graph(n=30, m=90, seed=seed)
    yield "comm", community_graph(n=50, n_cliques=15, n_noise=20, seed=4)


@pytest.mark.parametrize("label,pdf", list(_graphs()), ids=lambda p: p if isinstance(p, str) else "")
def test_spark_support_matches_duckdb(spark, label, pdf):
    edges = spark_edges(spark, pdf)
    assert_equivalent(support(edges), SUPPORT_SQL, edges=pdf)


@pytest.mark.parametrize("label,pdf", list(_graphs()), ids=lambda p: p if isinstance(p, str) else "")
def test_spark_triangles_match_duckdb(spark, label, pdf):
    edges = spark_edges(spark, pdf)
    assert_equivalent(triangles(edges), TRIANGLES_SQL, edges=pdf)


@pytest.mark.parametrize("seed", range(4))
def test_local_support_matches_duckdb_counts(seed):
    """The LocalGraph kernel's support agrees with the SQL oracle."""
    import duckdb

    pdf = random_graph(n=25, m=70, seed=seed)
    ref = support_naive(pdf)
    con = duckdb.connect()
    con.register("edges", pdf)
    sql = con.execute(SUPPORT_SQL).fetchdf()
    con.close()
    merged = ref.merge(sql, on=["src", "dst"], suffixes=("_loc", "_sql"))
    assert len(merged) == len(pdf)
    assert (merged["sup_loc"] == merged["sup_sql"]).all()
