"""pytest-benchmark target regenerating Figure 1: filter algorithms vs selectivity.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig1_filter.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig1_filter as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig1_filter(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, n_rows=BENCH_ROWS),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig1_filter", 'Figure 1: filter algorithms vs selectivity', rows, exp.PAPER, h)
    assert h["s3_vs_server_speedup_at_high_selectivity"] > 3.0
    assert h["s3_over_server_cost_ratio"] > 1.0
    assert h["index_fast_at_high_selectivity"]
    assert h["index_collapses_at_low_selectivity"]
