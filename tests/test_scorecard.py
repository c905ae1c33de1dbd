"""Scorecard (§4.2): BSI pipeline == normal Catalyst pipeline == DuckDB
oracle, for single pairs, batches, and the segment!=bucket path."""
import numpy as np
import pandas as pd
import pytest

from repro.core import scorecard as SC
from repro.oracle import assert_equivalent
from repro.platform import hashing as H
from tests.conftest import ALL_STRATEGIES, N_SEGMENTS


def _sorted(pdf):
    return pdf.sort_values(["strategy_id", "metric_id", "bucket_id"]).reset_index(
        drop=True
    )


ORACLE_SQL = """
WITH e AS (
  SELECT * FROM expose
  WHERE strategy_id IN ({strategies}) AND first_expose_date <= {date}
), m AS (
  SELECT * FROM metric WHERE date = {date} AND metric_id IN ({metrics})
), counts AS (
  SELECT strategy_id, segment_id AS bucket_id, COUNT(*) AS bucket_exposed
  FROM e GROUP BY 1, 2
), sums AS (
  SELECT e.strategy_id, m.metric_id, e.segment_id AS bucket_id,
         CAST(SUM(m.value) AS DOUBLE) AS bucket_sum
  FROM e JOIN m ON e.analysis_unit_id = m.analysis_unit_id
  GROUP BY 1, 2, 3
), grid AS (
  SELECT c.strategy_id, mm.metric_id, c.bucket_id, c.bucket_exposed
  FROM counts c CROSS JOIN (SELECT DISTINCT metric_id FROM m) mm
)
SELECT g.strategy_id, g.metric_id, g.bucket_id,
       COALESCE(s.bucket_sum, 0.0) AS bucket_sum,
       g.bucket_exposed
FROM grid g
LEFT JOIN sums s USING (strategy_id, metric_id, bucket_id)
"""


def oracle_sql(strategies, metrics, date):
    return ORACLE_SQL.format(
        strategies=",".join(map(str, strategies)),
        metrics=",".join(map(str, metrics)),
        date=date,
    )


@pytest.mark.parametrize("strategy,metric,date", [
    (11, 1, 1), (11, 2, 3), (12, 3, 5), (21, 2, 2), (22, 3, 4),
])
def test_single_pair_bsi_vs_normal(world, strategy, metric, date):
    bsi = _sorted(
        SC.scorecard_bsi(
            world.expose_bsi, world.metric_bsi,
            strategy_ids=[strategy], metric_ids=[metric], date=date,
        ).toPandas()
    )
    normal = _sorted(
        SC.scorecard_normal(
            world.expose_sdf, world.metric_sdf,
            strategy_ids=[strategy], metric_ids=[metric], date=date,
        ).toPandas()
    )
    pd.testing.assert_frame_equal(
        bsi.astype("float64"), normal.astype("float64"), check_dtype=False
    )


@pytest.mark.parametrize("date", [1, 3, 5])
def test_normal_vs_duckdb_oracle(world, date):
    metrics = [1, 2, 3]
    out = SC.scorecard_normal(
        world.expose_sdf, world.metric_sdf,
        strategy_ids=ALL_STRATEGIES, metric_ids=metrics, date=date,
    )
    assert_equivalent(
        out,
        oracle_sql(ALL_STRATEGIES, metrics, date),
        expose=world.expose,
        metric=world.metric,
    )


def test_batch_bsi_vs_oracle(world, spark):
    out = SC.scorecard_bsi(
        world.expose_bsi, world.metric_bsi,
        strategy_ids=ALL_STRATEGIES, metric_ids=[1, 2, 3], date=3,
    )
    assert_equivalent(
        out,
        oracle_sql(ALL_STRATEGIES, [1, 2, 3], 3),
        expose=world.expose,
        metric=world.metric,
    )


def test_bucketed_matches_hash_buckets(world, spark):
    """segment != bucket path: per-bucket values must equal a normal
    groupby on bucket_of(randomization_unit_id)."""
    got = _sorted(
        SC.scorecard_bsi_bucketed(
            world.expose_bsi, world.metric_bsi,
            strategy_ids=[11], metric_ids=[2], date=4, n_buckets=N_SEGMENTS,
        ).toPandas()
    )
    e = world.expose[
        (world.expose.strategy_id == 11) & (world.expose.first_expose_date <= 4)
    ].copy()
    e["bucket_id"] = H.bucket_of(e["randomization_unit_id"].to_numpy(), N_SEGMENTS)
    m = world.metric[(world.metric.date == 4) & (world.metric.metric_id == 2)]
    j = e.merge(m, on="analysis_unit_id")
    sums = j.groupby("bucket_id")["value"].sum()
    counts = e.groupby("bucket_id").size()
    exp = pd.DataFrame(
        {
            "bucket_id": counts.index,
            "bucket_sum": [float(sums.get(b, 0)) for b in counts.index],
            "bucket_exposed": counts.to_numpy(),
        }
    )
    assert (got["bucket_sum"].to_numpy() == exp["bucket_sum"].to_numpy()).all()
    assert (got["bucket_exposed"].to_numpy() == exp["bucket_exposed"].to_numpy()).all()


def test_bucketed_totals_match_segment_path(world, spark):
    a = SC.scorecard_bsi(
        world.expose_bsi, world.metric_bsi,
        strategy_ids=[12], metric_ids=[3], date=5,
    ).toPandas()
    # n_buckets must match the bucket BSI's encoding (N_SEGMENTS here)
    b = SC.scorecard_bsi_bucketed(
        world.expose_bsi, world.metric_bsi,
        strategy_ids=[12], metric_ids=[3], date=5, n_buckets=N_SEGMENTS,
    ).toPandas()
    assert a["bucket_sum"].sum() == b["bucket_sum"].sum()
    assert a["bucket_exposed"].sum() == b["bucket_exposed"].sum()


def test_bucket_frame_to_arrays(world):
    pdf = SC.scorecard_bsi(
        world.expose_bsi, world.metric_bsi,
        strategy_ids=[11], metric_ids=[1], date=2,
    ).toPandas()
    sums, counts = SC.bucket_frame_to_arrays(
        pdf, strategy_id=11, metric_id=1, n_buckets=N_SEGMENTS
    )
    assert len(sums) == N_SEGMENTS
    assert sums.sum() == pdf["bucket_sum"].sum()
    assert counts.sum() == pdf["bucket_exposed"].sum()
