"""DuckDB correctness oracle.

``assert_equivalent(spark_df, sql, **tables)`` runs ``sql`` in DuckDB
over ``tables`` and asserts the sorted rows match ``spark_df`` (the
Spark result). This catches wrong results from a rewritten plan or a
custom operator — "it ran" is not "it is correct".

``tables`` may be Spark or pandas DataFrames; Spark inputs are
collected via ``.toPandas()``. Alias every output column identically
on both sides (Spark names ``count(*)`` as ``count(1)``, DuckDB as
``count_star()``) and project to scalar columns — array/map/struct
columns are not orderable so cannot be compared here.
"""
import duckdb
import pandas as pd
from pyspark.sql import DataFrame


def _canon(pdf: pd.DataFrame) -> pd.DataFrame:
    # Canonical column order first, then row order by those columns, so
    # two results that differ only in projection order compare equal.
    pdf = pdf[sorted(pdf.columns)].reset_index(drop=True).copy()
    for c in pdf.select_dtypes(include=["float", "float64"]).columns:
        pdf[c] = pdf[c].round(6)
    return pdf.sort_values(list(pdf.columns)).reset_index(drop=True)


def assert_equivalent(spark_df: DataFrame, sql: str, **tables) -> None:
    con = duckdb.connect()
    try:
        for name, t in tables.items():
            con.register(name, t.toPandas() if isinstance(t, DataFrame) else t)
        expected = con.execute(sql).fetchdf()
    finally:
        con.close()
    got = spark_df.toPandas()
    assert set(expected.columns) == set(got.columns), (
        f"column mismatch: {sorted(got.columns)} vs {sorted(expected.columns)} "
        "— alias every output column identically on both sides"
    )
    pd.testing.assert_frame_equal(
        _canon(got), _canon(expected), check_dtype=False
    )


# ---------------------------------------------------------------------------
# Graph-query SQL builders (DuckDB recursive CTEs) — independent oracle for
# the simple-path-graph reproduction. Used with ``assert_equivalent``: the
# Spark result (edges of SPG_k, path strings, or BFS distances) is diffed
# against DuckDB evaluating the *definition* directly over the same edge
# list, registered under table name ``edges`` with columns (src, dst).
# ---------------------------------------------------------------------------

def _walk_cte(s: int, t: int, k: int) -> str:
    # All simple paths s->t with <= k edges, enumerated as vertex lists.
    return f"""
WITH RECURSIVE walk(cur, verts) AS (
  SELECT {s}::BIGINT, [{s}::BIGINT]
  UNION ALL
  SELECT e.dst, list_append(w.verts, e.dst)
  FROM walk w JOIN edges e ON e.src = w.cur
  WHERE NOT list_contains(w.verts, e.dst)
    AND w.cur <> {t}
    AND len(w.verts) <= {k}
),
paths AS (SELECT verts FROM walk WHERE cur = {t} AND len(verts) >= 2)
"""


def spg_sql(s: int, t: int, k: int) -> str:
    """SQL for E(SPG_k(s,t)) over table ``edges`` → rows (src, dst)."""
    return (
        _walk_cte(s, t, k)
        + f"""
, idx AS (SELECT unnest(range(1, {k + 1})) AS i)
SELECT DISTINCT verts[i] AS src, verts[i+1] AS dst
FROM paths, idx WHERE i < len(verts)
"""
    )


def paths_sql(s: int, t: int, k: int) -> str:
    """SQL for P*_k(s,t) as canonical dash-joined strings → rows (path)."""
    return (
        _walk_cte(s, t, k)
        + """
SELECT DISTINCT array_to_string(verts, '-') AS path FROM paths
"""
    )


def distances_sql(source: int, max_depth: int, reversed_: bool = False) -> str:
    """SQL for bounded BFS distances from ``source`` → rows (v, dist)."""
    a, b = ("dst", "src") if reversed_ else ("src", "dst")
    return f"""
WITH RECURSIVE reach(v, d) AS (
  SELECT {source}::BIGINT, 0
  UNION
  SELECT e.{b}, r.d + 1
  FROM reach r JOIN edges e ON e.{a} = r.v
  WHERE r.d < {max_depth}
)
SELECT v, MIN(d)::INT AS dist FROM reach GROUP BY v HAVING MIN(d) <= {max_depth}
"""
