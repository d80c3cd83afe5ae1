"""Spark helpers for iterative dataflow.

Iterative algorithms (BFS levels, propagation layers) reference each
iteration's DataFrame more than once (next iteration + final union); left
lazy, the *logical plan* re-expands the whole upstream chain at every
reference, which is exponential in the number of iterations — Catalyst
analysis alone becomes the bottleneck. :class:`DFPin` cuts each iteration's
lineage with ``localCheckpoint(eager=False)``: the plan is truncated to a
``LogicalRDD`` immediately (planning stays O(1) per level) while computation
is deferred, so the whole query still executes as a handful of jobs and each
level's RDD is computed once (levels are separated by shuffle boundaries,
which Spark's scheduler evaluates once per job). Checkpoint blocks are freed
when the RDDs are garbage-collected after :meth:`DFPin.release`.
"""
from __future__ import annotations

import os
from contextlib import contextmanager

from pyspark.sql import DataFrame, SparkSession


def ensure_session_env() -> None:
    """Pre-JVM-launch tuning for the sandboxed local-mode environment.

    Must run before the first SparkSession is created. Adds shuffle-local
    directories on tmpfs (the sandbox's overlay filesystem makes shuffle
    file I/O disproportionately slow) and disables the console progress bar
    (which floods captured test output). Safe to call repeatedly; respects
    an existing setting.
    """
    extra = (
        "--conf spark.local.dir=/dev/shm/spark-local "
        "--conf spark.ui.showConsoleProgress=false "
    )
    args = os.environ.get("PYSPARK_SUBMIT_ARGS")
    if args is None:
        os.environ["PYSPARK_SUBMIT_ARGS"] = (
            f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
            f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
            "--conf spark.driver.host=127.0.0.1 "
            "--conf spark.ui.enabled=false " + extra + "pyspark-shell"
        )
    elif "spark.local.dir" not in args:
        os.environ["PYSPARK_SUBMIT_ARGS"] = args.replace(
            "pyspark-shell", extra + "pyspark-shell"
        )


def tune_runtime(spark: SparkSession, n_partitions: int = 4) -> None:
    """Post-launch tuning for per-query graph dataflow.

    The per-query subgraphs are tiny next to the session's OLAP defaults:
    use few shuffle partitions and skip AQE's per-shuffle re-optimisation
    (it buys nothing at this scale and costs latency on every exchange).
    """
    spark.conf.set("spark.sql.shuffle.partitions", str(n_partitions))
    spark.conf.set("spark.sql.adaptive.enabled", "false")


class DFPin:
    """Truncate lineage of per-iteration DataFrames; drop refs at release."""

    def __init__(self, eager: bool = False) -> None:
        self._eager = eager
        self._held: list[DataFrame] = []

    def __call__(self, df: DataFrame) -> DataFrame:
        df = df.localCheckpoint(eager=self._eager)
        self._held.append(df)
        return df

    def release(self) -> None:
        # localCheckpoint blocks are cleaned by the ContextCleaner once the
        # RDDs are unreachable; dropping our references is sufficient.
        self._held.clear()


def no_pin(df: DataFrame) -> DataFrame:
    """Identity pin (for callers managing materialisation themselves)."""
    return df


@contextmanager
def query_pin():
    """``with query_pin() as pin: …`` — auto-release on exit."""
    pin = DFPin()
    try:
        yield pin
    finally:
        pin.release()


@contextmanager
def shuffle_partitions(spark: SparkSession, n: int):
    """Temporarily set ``spark.sql.shuffle.partitions`` (tiny per-query graphs
    do not benefit from the session-wide OLAP default)."""
    old = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", str(n))
    try:
        yield
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", old)


def partitions_for(n_edges: int) -> int:
    """Shuffle-partition heuristic for per-query subgraph dataflow."""
    if n_edges < 50_000:
        return 1
    if n_edges < 500_000:
        return 4
    return 16
