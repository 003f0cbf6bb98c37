"""pytest-benchmark target regenerating Figure 2: join vs customer selectivity.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig2_join_customer.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig2_join_customer as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig2_join_customer(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, sf=BENCH_SF),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig2_join_customer", 'Figure 2: join vs customer selectivity', rows, exp.PAPER, h)
    assert h["bloom_speedup_vs_baseline_at_high_selectivity"] > 1.3
    assert h["baseline_filtered_similar"]
    assert h["bloom_degrades_with_selectivity"]
