"""Deep dive (§4.4): dimension-filtered scorecards, BSI == normal ==
pandas reference, including the paper's exact predicate example."""
import pandas as pd
import pytest

from repro.core import deepdive as DD
from repro.oracle import assert_equivalent
from repro.platform import hashing as H
from tests.conftest import N_SEGMENTS

# the §4.4 example: client-type = 1 AND client-version > 134
PAPER_PREDICATES = [("client-type", "eq", 1), ("client-version", "gt", 134)]


def _sorted(pdf):
    return pdf.sort_values(["strategy_id", "metric_id", "bucket_id"]).reset_index(
        drop=True
    )


@pytest.mark.parametrize("predicates", [
    PAPER_PREDICATES,
    [("client-type", "eq", 3)],
    [("client-version", "le", 120)],
    [("client-type", "ne", 2), ("client-version", "ge", 110)],
])
def test_bsi_vs_normal(world, predicates):
    kw = dict(strategy_ids=[11, 12], metric_ids=[1, 3], date=3, predicates=predicates)
    bsi = _sorted(
        DD.deepdive_bsi(
            world.expose_bsi, world.metric_bsi, world.dim_bsi, **kw
        ).toPandas()
    )
    normal = _sorted(
        DD.deepdive_normal(
            world.expose_sdf, world.metric_sdf, world.dim_sdf, **kw
        ).toPandas()
    )
    pd.testing.assert_frame_equal(
        bsi.astype("float64"), normal.astype("float64"), check_dtype=False
    )


def test_normal_vs_duckdb_oracle(world):
    out = DD.deepdive_normal(
        world.expose_sdf, world.metric_sdf, world.dim_sdf,
        strategy_ids=[21, 22], metric_ids=[2], date=3,
        predicates=PAPER_PREDICATES,
    )
    sql = """
    WITH q1 AS (
      SELECT analysis_unit_id FROM dim
      WHERE date = 3 AND dimension_name = 'client-type' AND value = 1
    ), q2 AS (
      SELECT analysis_unit_id FROM dim
      WHERE date = 3 AND dimension_name = 'client-version' AND value > 134
    ), e AS (
      SELECT * FROM expose
      WHERE strategy_id IN (21, 22) AND first_expose_date <= 3
        AND analysis_unit_id IN (SELECT analysis_unit_id FROM q1)
        AND analysis_unit_id IN (SELECT analysis_unit_id FROM q2)
    ), m AS (
      SELECT * FROM metric WHERE date = 3 AND metric_id = 2
    ), counts AS (
      SELECT strategy_id, segment_id AS bucket_id, COUNT(*) AS bucket_exposed
      FROM e GROUP BY 1, 2
    ), sums AS (
      SELECT e.strategy_id, e.segment_id AS bucket_id,
             CAST(SUM(m.value) AS DOUBLE) AS bucket_sum
      FROM e JOIN m USING (analysis_unit_id) GROUP BY 1, 2
    )
    SELECT c.strategy_id, CAST(2 AS BIGINT) AS metric_id, c.bucket_id,
           COALESCE(s.bucket_sum, 0.0) AS bucket_sum, c.bucket_exposed
    FROM counts c LEFT JOIN sums s USING (strategy_id, bucket_id)
    """
    assert_equivalent(
        out, sql, expose=world.expose, metric=world.metric, dim=world.dim
    )


def test_dim_filter_counts(world):
    """The merged filter's cardinality equals the pandas predicate."""
    flt = DD.dim_filter_bsi(
        world.dim_bsi, predicates=PAPER_PREDICATES, date=3
    ).toPandas()
    from repro.bsi.bsi import BSI

    got = sum(BSI.deserialize(b).count() for b in flt["dim_filter"])
    d = world.dim[world.dim.date == 3]
    ct = d[(d.dimension_name == "client-type") & (d.value == 1)]["analysis_unit_id"]
    cv = d[(d.dimension_name == "client-version") & (d.value > 134)]["analysis_unit_id"]
    assert got == len(set(ct) & set(cv))


def test_filtered_population_subset_of_unfiltered(world):
    from repro.core import scorecard as SC

    full = SC.scorecard_bsi(
        world.expose_bsi, world.metric_bsi,
        strategy_ids=[11], metric_ids=[1], date=3,
    ).toPandas()
    dd = DD.deepdive_bsi(
        world.expose_bsi, world.metric_bsi, world.dim_bsi,
        strategy_ids=[11], metric_ids=[1], date=3,
        predicates=[("client-type", "eq", 1)],
    ).toPandas()
    assert dd["bucket_exposed"].sum() < full["bucket_exposed"].sum()
    assert dd["bucket_sum"].sum() <= full["bucket_sum"].sum()
    assert dd["bucket_exposed"].sum() > 0
