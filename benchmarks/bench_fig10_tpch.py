"""pytest-benchmark target regenerating Figure 10: TPC-H suite, baseline vs optimized.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig10_tpch.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig10_tpch as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig10_tpch(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, sf=BENCH_SF),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig10_tpch", 'Figure 10: TPC-H suite, baseline vs optimized', rows, exp.PAPER, h)
    assert h["optimized_faster_on_geomean"]
    assert h["geomean_speedup"] > 2.0
    assert h["geomean_cost_ratio"] < 1.0  # paper: 30% cheaper on geo-mean
