"""Pre-experiment / CUPED (§4.3): BSI pipeline == normal == oracle,
tree-accelerated == linear, and end-to-end CUPED sharpening."""
import numpy as np
import pandas as pd
import pytest

from repro.core import preexperiment as PE
from repro.core import scorecard as SC
from repro.oracle import assert_equivalent
from tests.conftest import N_SEGMENTS


def _sorted(pdf):
    return pdf.sort_values(["strategy_id", "metric_id", "bucket_id"]).reset_index(
        drop=True
    )


def test_bsi_vs_normal(world):
    kw = dict(strategy_ids=[11, 12], metric_id=3, pre_lo=1, pre_hi=3, expose_date=5)
    bsi = _sorted(
        PE.preexperiment_bsi(world.expose_bsi, world.metric_bsi, **kw).toPandas()
    )
    normal = _sorted(
        PE.preexperiment_normal(world.expose_sdf, world.metric_sdf, **kw).toPandas()
    )
    pd.testing.assert_frame_equal(
        bsi.astype("float64"), normal.astype("float64"), check_dtype=False
    )


def test_tree_equals_linear(world):
    kw = dict(strategy_ids=[21], metric_id=2, pre_lo=1, pre_hi=4, expose_date=5)
    a = _sorted(
        PE.preexperiment_bsi(
            world.expose_bsi, world.metric_bsi, use_tree=True, **kw
        ).toPandas()
    )
    b = _sorted(
        PE.preexperiment_bsi(
            world.expose_bsi, world.metric_bsi, use_tree=False, **kw
        ).toPandas()
    )
    pd.testing.assert_frame_equal(a, b)


def test_normal_vs_duckdb_oracle(world):
    out = PE.preexperiment_normal(
        world.expose_sdf, world.metric_sdf,
        strategy_ids=[11, 12], metric_id=3, pre_lo=1, pre_hi=3, expose_date=5,
    )
    sql = """
    WITH e AS (
      SELECT * FROM expose
      WHERE strategy_id IN (11, 12) AND first_expose_date <= 5
    ), m AS (
      SELECT analysis_unit_id, SUM(value) AS pre_value
      FROM metric WHERE metric_id = 3 AND date BETWEEN 1 AND 3
      GROUP BY 1
    ), counts AS (
      SELECT strategy_id, segment_id AS bucket_id, COUNT(*) AS bucket_exposed
      FROM e GROUP BY 1, 2
    ), sums AS (
      SELECT e.strategy_id, e.segment_id AS bucket_id,
             CAST(SUM(m.pre_value) AS DOUBLE) AS bucket_sum
      FROM e JOIN m USING (analysis_unit_id) GROUP BY 1, 2
    )
    SELECT c.strategy_id, CAST(3 AS BIGINT) AS metric_id, c.bucket_id,
           COALESCE(s.bucket_sum, 0.0) AS bucket_sum, c.bucket_exposed
    FROM counts c LEFT JOIN sums s USING (strategy_id, bucket_id)
    """
    assert_equivalent(out, sql, expose=world.expose, metric=world.metric)


def test_preperiod_sum_totals(world):
    agg = PE.preperiod_sum_bsi(
        world.metric_bsi, metric_id=2, pre_lo=2, pre_hi=4
    ).toPandas()
    from repro.bsi.bsi import BSI

    total = sum(BSI.deserialize(b).sum() for b in agg["value"])
    raw = world.metric[
        (world.metric.metric_id == 2) & world.metric.date.between(2, 4)
    ]["value"].sum()
    assert total == raw


def test_cuped_analysis_aa_is_calibrated(world):
    """A/A world: CUPED must not fabricate an effect; covariate is the
    metric's own earlier days, so correlation is real and variance
    should not increase."""
    score = SC.scorecard_bsi(
        world.expose_bsi, world.metric_bsi,
        strategy_ids=[11, 12], metric_ids=[3], date=5,
    ).toPandas()
    cov = PE.preexperiment_bsi(
        world.expose_bsi, world.metric_bsi,
        strategy_ids=[11, 12], metric_id=3, pre_lo=1, pre_hi=3, expose_date=5,
    ).toPandas()
    res = PE.cuped_analysis(
        score, cov, treatment_id=12, control_id=11, metric_id=3,
        n_buckets=N_SEGMENTS,
    )
    assert res["adjusted"].p_value > 0.001  # no false effect
    assert res["variance_reduction"] > -0.25
    assert np.isfinite(res["theta"])
