"""Ad-hoc engine (§5.3): both query methods agree with each other,
with a pandas reference, and with the Spark BSI scorecard."""
import numpy as np
import pandas as pd
import pytest

from repro.platform.adhoc import AdhocEngine
from tests.conftest import ALL_STRATEGIES, DATES, N_SEGMENTS, N_USERS


@pytest.fixture(scope="module")
def engine(world):
    return AdhocEngine.from_logs(
        users_pdf=world.users,
        metric_pdf=world.metric,
        expose_pdf=world.expose,
        n_segments=N_SEGMENTS,
        dates=DATES,
        workers=4,
    )


def _reference(world, strategy_ids, metric_ids, dates):
    rows = []
    for sid in strategy_ids:
        e = world.expose[world.expose.strategy_id == sid]
        for d in dates:
            exposed_units = e[e.first_expose_date <= d]["analysis_unit_id"]
            for mid in metric_ids:
                m = world.metric[
                    (world.metric.metric_id == mid) & (world.metric.date == d)
                ]
                v = m[m.analysis_unit_id.isin(exposed_units)]["value"].sum()
                rows.append((sid, mid, d, float(v), len(exposed_units)))
    return (
        pd.DataFrame(
            rows, columns=["strategy_id", "metric_id", "date", "value_sum", "exposed"]
        )
        .sort_values(["strategy_id", "metric_id", "date"])
        .reset_index(drop=True)
    )


def _sorted(pdf):
    return pdf.sort_values(["strategy_id", "metric_id", "date"]).reset_index(drop=True)


def test_bsi_matches_reference(world, engine):
    got = _sorted(
        engine.query_bsi(strategy_ids=[11, 21], metric_ids=[1, 2], dates=[1, 3, 5])
    )
    exp = _reference(world, [11, 21], [1, 2], [1, 3, 5])
    pd.testing.assert_frame_equal(got.astype("float64"), exp.astype("float64"))


def test_normal_matches_reference(world, engine):
    got = _sorted(
        engine.query_normal(strategy_ids=[12, 22], metric_ids=[2, 3], dates=[2, 4])
    )
    exp = _reference(world, [12, 22], [2, 3], [2, 4])
    pd.testing.assert_frame_equal(got.astype("float64"), exp.astype("float64"))


def test_bsi_equals_normal_full_grid(world, engine):
    kw = dict(strategy_ids=ALL_STRATEGIES, metric_ids=[1, 2, 3], dates=DATES)
    a = _sorted(engine.query_bsi(**kw))
    b = _sorted(engine.query_normal(**kw))
    pd.testing.assert_frame_equal(a.astype("float64"), b.astype("float64"))


def test_sequential_equals_parallel(world):
    seq = AdhocEngine.from_logs(
        users_pdf=world.users, metric_pdf=world.metric, expose_pdf=world.expose,
        n_segments=N_SEGMENTS, dates=DATES, workers=1,
    )
    par = AdhocEngine.from_logs(
        users_pdf=world.users, metric_pdf=world.metric, expose_pdf=world.expose,
        n_segments=N_SEGMENTS, dates=DATES, workers=8,
    )
    kw = dict(strategy_ids=[11], metric_ids=[3], dates=[5])
    pd.testing.assert_frame_equal(
        _sorted(seq.query_bsi(**kw)), _sorted(par.query_bsi(**kw))
    )


def test_matches_spark_scorecard(world, engine):
    from repro.core import scorecard as SC

    spark_res = SC.scorecard_bsi(
        world.expose_bsi, world.metric_bsi,
        strategy_ids=[11], metric_ids=[2], date=4,
    ).toPandas()
    adhoc_res = engine.query_bsi(strategy_ids=[11], metric_ids=[2], dates=[4])
    assert adhoc_res["value_sum"].sum() == spark_res["bucket_sum"].sum()
    assert adhoc_res["exposed"].sum() == spark_res["bucket_exposed"].sum()
