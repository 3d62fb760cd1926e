"""Shared helpers for the reproduction benchmarks.

``record`` accumulates paper-vs-measured rows; ``benchmarks/conftest``
prints them as tables at the end of the run and dumps ``results.json``.
"""
import time

RESULTS: list[dict] = []


def record(table: str, **row) -> None:
    """Append one printable row to the reproduction table ``table``."""
    RESULTS.append({"table": table, **row})


def timed(fn, *args, **kwargs):
    """(seconds, result) of one call."""
    t0 = time.perf_counter()
    out = fn(*args, **kwargs)
    return time.perf_counter() - t0, out


def best_of(n, fn, *args, **kwargs):
    """Min wall time over n calls (steady-state measurement)."""
    times = []
    out = None
    for _ in range(n):
        dt, out = timed(fn, *args, **kwargs)
        times.append(dt)
    return min(times), out


from contextlib import contextmanager


@contextmanager
def catalyst_pushdown_disabled(spark):
    """Model an engine WITHOUT filter-pushdown optimization.

    Our "unoptimized plan" baselines would otherwise be silently
    re-optimized by Catalyst's own PushDownPredicates, making the RBO
    comparison measure nothing.  Excluding those rules makes the
    baseline an honest no-pushdown engine.
    """
    key = "spark.sql.optimizer.excludedRules"
    rules = ",".join(
        [
            "org.apache.spark.sql.catalyst.optimizer.PushDownPredicates",
            "org.apache.spark.sql.catalyst.optimizer.InferFiltersFromConstraints",
        ]
    )
    try:
        old = spark.conf.get(key)
    except Exception:
        old = None
    spark.conf.set(key, rules)
    try:
        yield
    finally:
        if old is None:
            spark.conf.unset(key)
        else:
            spark.conf.set(key, old)


@contextmanager
def aqe_disabled(spark):
    """Fixed-plan execution for engine comparisons.

    AQE re-plans per stage (skew splitting, coalescing) *between* our
    modeled engines differently depending on whether their fragments
    are pre-partitioned, which confounds the architectural comparison;
    real BSP engines run fixed per-superstep plans.
    """
    key = "spark.sql.adaptive.enabled"
    old = spark.conf.get(key)
    spark.conf.set(key, "false")
    try:
        yield
    finally:
        spark.conf.set(key, old)
