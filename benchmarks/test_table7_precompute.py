"""Table 7 — Spark pre-computation of a scorecard batch (96 strategy-
metric pairs over a 200k-user universe), BSI pipeline vs the normal
Spark-SQL pipeline. Workload build (logs + BSI conversion + caching)
happens once outside the timed region, as in the paper's daily
pipeline where the warehouse already holds both formats.

Paper (240k pairs, ~21M exposed users/strategy, 105 metrics):
    Normal 22,712 CPU-hours / BSI 5,446 CPU-hours (~4.2x)
"""
import pytest

from repro.core.evaluation import table7_build, table7_run_bsi, table7_run_normal


@pytest.fixture(scope="module")
def workload(spark):
    return table7_build(spark)


@pytest.mark.benchmark(group="table7")
def test_table7_bsi(benchmark, workload):
    benchmark.extra_info.update({"fmt": "bsi", "pairs": workload.n_pairs})
    r = benchmark.pedantic(table7_run_bsi, args=(workload,), rounds=5, iterations=1, warmup_rounds=1)
    assert len(r) > 0


@pytest.mark.benchmark(group="table7")
def test_table7_normal(benchmark, workload):
    benchmark.extra_info.update({"fmt": "normal", "pairs": workload.n_pairs})
    r = benchmark.pedantic(table7_run_normal, args=(workload,), rounds=5, iterations=1, warmup_rounds=1)
    assert len(r) > 0
