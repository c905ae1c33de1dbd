"""Table 6 — single-core compute: sum of each user's metric values
over two days, normal format vs BSI format, for the three typical
metrics of Table 5 (rows scaled x1e-3 from the paper).

Paper (single C++ thread, 2.4 GHz):
    A: normal 59.2 s  / BSI 0.6 s   (~99x)
    B: normal  7.3 s  / BSI 1.3 s   (~5.6x)
    C: normal 94.3 s  / BSI 10.5 s  (~9x)
"""
import pytest

from repro.core.evaluation import table6_run_bsi, table6_run_normal, table56_build


@pytest.fixture(scope="module")
def workload():
    return table56_build()


@pytest.mark.benchmark(group="table6")
@pytest.mark.parametrize("metric", ["A", "B", "C"])
def test_table6_bsi(benchmark, workload, metric):
    d = workload[metric]
    benchmark.extra_info.update({"metric": metric, "fmt": "bsi", "rows_per_day": d.rows})
    benchmark(table6_run_bsi, d)


@pytest.mark.benchmark(group="table6")
@pytest.mark.parametrize("metric", ["A", "B", "C"])
def test_table6_normal(benchmark, workload, metric):
    d = workload[metric]
    benchmark.extra_info.update({"metric": metric, "fmt": "normal", "rows_per_day": d.rows})
    benchmark(table6_run_normal, d)
