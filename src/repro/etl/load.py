"""V-ETL Load: warehouse the extracted entities and query them in SQL.

The paper's point of V-ETL is that after Transform, queries are plain
SQL over small relational tables ("obtaining the EV counts is a simple
count query on a Detections table", Section 1).  This module builds
those tables and the example analytics; every query result is verified
against DuckDB through ``repro.oracle.assert_equivalent`` in the tests,
so a broken Catalyst plan or UDF is caught as a wrong *result*, not a
crash.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def ev_counts_per_hour(det_df: DataFrame) -> DataFrame:
    """The introduction's EV-charger example: EV detections per hour."""
    return (
        det_df.where(F.col("is_ev"))
        .groupBy(F.floor(F.col("t_start") / 3600).cast("long").alias("hour"))
        .agg(F.count(F.lit(1)).alias("ev_count"))
    )


def detections_per_class(det_df: DataFrame) -> DataFrame:
    """Object counts and mean confidence per class."""
    return det_df.groupBy("klass").agg(
        F.count(F.lit(1)).alias("n"),
        F.round(F.avg("confidence"), 6).alias("avg_conf"),
    )


def segment_stats(det_df: DataFrame) -> DataFrame:
    """Per-segment detection counts + confidence (warehouse fact table)."""
    return det_df.groupBy("segment_id").agg(
        F.count(F.lit(1)).alias("n_detections"),
        F.round(F.avg("confidence"), 6).alias("avg_conf"),
        F.max(F.col("is_ev").cast("int")).alias("any_ev"),
    )


def busiest_hours(det_df: DataFrame, top: int = 5) -> DataFrame:
    """Top-k hours by detections (typical warehouse query)."""
    return (
        det_df.groupBy(
            F.floor(F.col("t_start") / 3600).cast("long").alias("hour")
        )
        .agg(F.count(F.lit(1)).alias("n"))
        .orderBy(F.desc("n"), F.asc("hour"))
        .limit(top)
    )
