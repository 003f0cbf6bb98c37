"""pytest-benchmark target regenerating Figure 7: group-by vs data skew.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig7_groupby_skew.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig7_groupby_skew as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig7_groupby_skew(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, n_rows=BENCH_ROWS // 2),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig7_groupby_skew", 'Figure 7: group-by vs data skew', rows, exp.PAPER, h)
    assert h["hybrid_wins_at_high_skew"]
    assert h["filtered_flat"]
    assert h["hybrid_not_cheaper"]
