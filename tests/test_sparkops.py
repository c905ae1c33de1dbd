"""Spark BSI operators: UDFs and grouped reducers vs plain pandas."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.bsi import sparkops as SO
from repro.bsi.bsi import BSI


def test_bsi_sum_and_count_udf(world):
    got = (
        world.metric_bsi.select(
            "segment_id",
            "date",
            "metric_id",
            SO.bsi_sum_udf("value").alias("s"),
            SO.bsi_count_udf("value").alias("c"),
        )
        .toPandas()
        .groupby(["date", "metric_id"])[["s", "c"]]
        .sum()
    )
    exp = world.metric.groupby(["date", "metric_id"]).agg(
        s=("value", "sum"), c=("value", "count")
    )
    assert np.allclose(got["s"].to_numpy(), exp["s"].to_numpy())
    assert (got["c"].to_numpy() == exp["c"].to_numpy()).all()


def test_le_const_and_mul_and_sum_filtered(world, spark):
    df = world.metric_bsi.filter("metric_id = 2 AND date = 1")
    out = df.select(
        "segment_id",
        SO.bsi_le_const_udf("value", F.lit(3)).alias("flt"),
        "value",
    ).select(
        "segment_id",
        SO.bitmap_card_udf("flt").alias("n_small"),
        SO.bsi_sum_filtered_udf("value", "flt").alias("s_small"),
    )
    got = out.toPandas().sum()
    raw = world.metric[(world.metric.metric_id == 2) & (world.metric.date == 1)]
    assert got["n_small"] == (raw["value"] <= 3).sum()
    assert got["s_small"] == raw.loc[raw["value"] <= 3, "value"].sum()


def test_bsi_add_udf(world, spark):
    d1 = world.metric_bsi.filter("metric_id = 1 AND date = 1").select(
        "segment_id", F.col("value").alias("v1")
    )
    d2 = world.metric_bsi.filter("metric_id = 1 AND date = 2").select(
        "segment_id", F.col("value").alias("v2")
    )
    both = d1.join(d2, "segment_id").select(
        SO.bsi_sum_udf(SO.bsi_add_udf("v1", "v2")).alias("s")
    )
    got = both.toPandas()["s"].sum()
    raw = world.metric[
        (world.metric.metric_id == 1) & (world.metric.date.isin([1, 2]))
    ]["value"].sum()
    assert got == raw


def test_grouped_sum_bsi(world, spark):
    fn, schema = SO.grouped_sum_bsi(["segment_id", "metric_id"], "value")
    agg = (
        world.metric_bsi.filter("metric_id = 2")
        .groupBy("segment_id", "metric_id")
        .applyInPandas(fn, schema)
    )
    total = agg.select(SO.bsi_sum_udf("value").alias("s")).toPandas()["s"].sum()
    assert total == world.metric[world.metric.metric_id == 2]["value"].sum()


def test_grouped_distinct_pos_unique_visitors(world, spark):
    fn, schema = SO.grouped_distinct_pos(["segment_id", "metric_id"], "value")
    agg = (
        world.metric_bsi.filter("metric_id = 2")
        .groupBy("segment_id", "metric_id")
        .applyInPandas(fn, schema)
    )
    uv = agg.select(SO.bsi_count_udf("value").alias("c")).toPandas()["c"].sum()
    raw_uv = world.metric[world.metric.metric_id == 2]["analysis_unit_id"].nunique()
    assert uv == raw_uv
