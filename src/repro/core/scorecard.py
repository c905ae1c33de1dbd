"""Scorecard computation (§4.2): per-bucket metric sums + exposed
counts for strategy-metric pairs, in two interchangeable pipelines.

**BSI pipeline** — the paper's method. Expose and metric logs are in
their Table 2 BSI form; the two frames are joined on ``segment_id``
(all BSIs of a segment are position-aligned by construction, §4.1.1),
and per joined row the expose filter is the constant predicate
``offset <= date - min_expose_date + 1``; the bucket value is
``sum(value * filter)`` evaluated directly on slices.

**Normal pipeline** — the paper's pre-BSI baseline: plain Catalyst
join / filter / groupBy over the row-format logs, exactly the Spark
SQL shape printed in §4.2.

Both return the same schema so the statistical layer (:mod:`stats`)
and the tests can diff them row-for-row:

    strategy_id, metric_id, bucket_id, bucket_sum, bucket_exposed

In the common case the analysis unit is the randomization unit and
``bucket_id == segment_id`` (§3.3); the ``*_bucketed`` variants handle
the general case where buckets come from the randomization-unit hash.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.bsi.bitmap import RoaringBitmap
from repro.bsi.bsi import BSI

RESULT_SCHEMA = (
    "strategy_id long, metric_id long, bucket_id int, "
    "bucket_sum double, bucket_exposed long"
)


# -- BSI pipeline -----------------------------------------------------
def _score_rows(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
    """mapInPandas kernel: one output row per (segment, strategy,
    metric) join row; bucket == segment here."""
    for pdf in it:
        rows = []
        for r in pdf.itertuples(index=False):
            offset = BSI.deserialize(r.offset).densify()
            value = BSI.deserialize(r.value).densify()
            thr = int(r.date) - int(r.min_expose_date) + 1
            flt = offset.le_const(thr)
            rows.append(
                (
                    int(r.strategy_id),
                    int(r.metric_id),
                    int(r.segment_id),
                    float(value.sum_filtered(flt)),
                    int(flt.cardinality()),
                )
            )
        yield pd.DataFrame(
            rows,
            columns=[
                "strategy_id",
                "metric_id",
                "bucket_id",
                "bucket_sum",
                "bucket_exposed",
            ],
        )


def _score_cogroup(left: pd.DataFrame, right: pd.DataFrame) -> pd.DataFrame:
    """Cogrouped kernel: one segment's expose rows (strategies) x
    metric rows. Every BSI is deserialized once per segment and every
    expose filter computed once per strategy — the paper's 'each job
    computes a batch of pairs to better utilise network traffic'."""
    cols = ["strategy_id", "metric_id", "bucket_id", "bucket_sum", "bucket_exposed"]
    if len(left) == 0 or len(right) == 0:
        return pd.DataFrame(columns=cols)
    metrics = [
        (int(m.metric_id), BSI.deserialize(m.value).densify())
        for m in right.itertuples(index=False)
    ]
    date = int(right.iloc[0]["date"])
    rows = []
    for e in left.itertuples(index=False):
        offset = BSI.deserialize(e.offset).densify()
        flt = offset.le_const(date - int(e.min_expose_date) + 1)
        exposed = int(flt.cardinality())
        for mid, value in metrics:
            rows.append(
                (
                    int(e.strategy_id),
                    mid,
                    int(e.segment_id),
                    float(value.sum_filtered(flt)),
                    exposed,
                )
            )
    return pd.DataFrame(rows, columns=cols)


def scorecard_bsi(
    expose_bsi: DataFrame,
    metric_bsi: DataFrame,
    *,
    strategy_ids: list[int],
    metric_ids: list[int],
    date: int,
) -> DataFrame:
    """Single-day scorecard for a batch of strategy-metric pairs on the
    BSI representation (bucket == segment case). Expose and metric BSI
    frames are cogrouped per segment so each blob crosses the wire
    once per batch, not once per pair."""
    e = expose_bsi.filter(F.col("strategy_id").isin([int(s) for s in strategy_ids]))
    m = metric_bsi.filter(
        (F.col("date") == date)
        & F.col("metric_id").isin([int(x) for x in metric_ids])
    )
    return (
        e.groupBy("segment_id")
        .cogroup(m.groupBy("segment_id"))
        .applyInPandas(_score_cogroup, RESULT_SCHEMA)
    )


def _score_rows_bucketed(n_buckets: int):
    """mapInPandas kernel for the general segment != bucket case
    (§4.2): per segment, sum filtered values by bucket-id BSI, emitting
    one row per (pair, bucket); the caller merges across segments."""

    def fn(it: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in it:
            rows = []
            for r in pdf.itertuples(index=False):
                offset = BSI.deserialize(r.offset).densify()
                value = BSI.deserialize(r.value).densify()
                bucket = BSI.deserialize(r.bucket).densify()
                thr = int(r.date) - int(r.min_expose_date) + 1
                flt = offset.le_const(thr)
                for b in range(n_buckets):
                    bm = bucket.eq_const(b + 1) & flt
                    if not bm:
                        continue
                    rows.append(
                        (
                            int(r.strategy_id),
                            int(r.metric_id),
                            b,
                            float(value.sum_filtered(bm)),
                            int(bm.cardinality()),
                        )
                    )
            yield pd.DataFrame(
                rows,
                columns=[
                    "strategy_id",
                    "metric_id",
                    "bucket_id",
                    "bucket_sum",
                    "bucket_exposed",
                ],
            )

    return fn


def scorecard_bsi_bucketed(
    expose_bsi: DataFrame,
    metric_bsi: DataFrame,
    *,
    strategy_ids: list[int],
    metric_ids: list[int],
    date: int,
    n_buckets: int,
) -> DataFrame:
    """General-case scorecard: buckets from the randomization-unit
    hash; per-segment partial bucket values merged across segments."""
    e = expose_bsi.filter(F.col("strategy_id").isin([int(s) for s in strategy_ids]))
    m = metric_bsi.filter(
        (F.col("date") == date)
        & F.col("metric_id").isin([int(x) for x in metric_ids])
    )
    per_segment = e.join(m, "segment_id").mapInPandas(
        _score_rows_bucketed(n_buckets), RESULT_SCHEMA
    )
    return per_segment.groupBy("strategy_id", "metric_id", "bucket_id").agg(
        F.sum("bucket_sum").alias("bucket_sum"),
        F.sum("bucket_exposed").alias("bucket_exposed"),
    )


# -- normal-format pipeline (the paper's pre-BSI baseline) ------------
def scorecard_normal(
    expose_df: DataFrame,
    metric_df: DataFrame,
    *,
    strategy_ids: list[int],
    metric_ids: list[int],
    date: int,
    bucket_col: str = "segment_id",
) -> DataFrame:
    """Catalyst join/filter/groupBy scorecard over row-format logs.

    ``bucket_col`` is ``segment_id`` in the common case; pass a
    precomputed bucket column for the general case. The exposed count
    comes from the expose log alone (a metric mean is per exposed
    user, §4.2), the sum from the expose ⋈ metric join."""
    e = expose_df.filter(
        F.col("strategy_id").isin([int(s) for s in strategy_ids])
        & (F.col("first_expose_date") <= date)
    )
    m = metric_df.filter(
        (F.col("date") == date)
        & F.col("metric_id").isin([int(x) for x in metric_ids])
    )
    # the metric side may carry its own segment_id; bucket attribution
    # comes from the expose side, so drop duplicates before the join
    m_clean = m.drop(*[c for c in (bucket_col,) if c in m.columns])
    sums = (
        e.join(m_clean, "analysis_unit_id")
        .groupBy("strategy_id", "metric_id", F.col(bucket_col).alias("bucket_id"))
        .agg(F.sum("value").cast("double").alias("bucket_sum"))
    )
    counts = e.groupBy(
        "strategy_id", F.col(bucket_col).alias("bucket_id")
    ).agg(F.count("*").alias("bucket_exposed"))
    metrics = m.select("metric_id").distinct()
    grid = counts.crossJoin(metrics)
    return (
        grid.join(sums, ["strategy_id", "metric_id", "bucket_id"], "left")
        .fillna({"bucket_sum": 0.0})
        .select(
            "strategy_id", "metric_id", "bucket_id", "bucket_sum", "bucket_exposed"
        )
    )


# -- bridging to the stats layer --------------------------------------
def bucket_frame_to_arrays(
    result_pdf: pd.DataFrame, *, strategy_id: int, metric_id: int, n_buckets: int
) -> tuple[np.ndarray, np.ndarray]:
    """(sums, counts) dense over bucket ids 0..n_buckets-1 for one
    strategy-metric pair — empty buckets count as (0, 0) replicates."""
    sel = result_pdf[
        (result_pdf["strategy_id"] == strategy_id)
        & (result_pdf["metric_id"] == metric_id)
    ]
    sums = np.zeros(n_buckets)
    counts = np.zeros(n_buckets, dtype=np.int64)
    sums[sel["bucket_id"].to_numpy()] = sel["bucket_sum"].to_numpy()
    counts[sel["bucket_id"].to_numpy()] = sel["bucket_exposed"].to_numpy()
    return sums, counts
