"""Per-community temporal usage profiles (data behind paper Figs 5 and 7).

Figures themselves are out of scope; these functions produce the exact
data series the figures plot — the proportion of each community's trips
per day-of-week (Fig 5) and per hour-of-day (Fig 7), attributing a trip
to the community it *starts* in.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.window import Window


def _profile(assignment: DataFrame, trips: DataFrame, key: str) -> DataFrame:
    c_src = assignment.select(
        F.col("group_id").alias("src_group"), F.col("community")
    )
    t = trips.join(c_src, "src_group")
    counts = t.groupBy("community", key).agg(F.count(F.lit(1)).alias("n"))
    total = Window.partitionBy("community")
    return counts.withColumn(
        "share", F.col("n") / F.sum("n").over(total)
    ).orderBy("community", key)


def day_profile(assignment: DataFrame, trips: DataFrame) -> DataFrame:
    """(community, day_of_week 1..7, n, share)."""
    return _profile(assignment, trips, "day_of_week")


def hour_profile(assignment: DataFrame, trips: DataFrame) -> DataFrame:
    """(community, hour 0..23, n, share)."""
    return _profile(assignment, trips, "hour")
