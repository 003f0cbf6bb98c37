"""pytest-benchmark target regenerating Figure 3: join vs orders selectivity.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig3_join_orders.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig3_join_orders as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig3_join_orders(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, sf=BENCH_SF),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig3_join_orders", 'Figure 3: join vs orders selectivity', rows, exp.PAPER, h)
    assert h["filtered_speedup_vs_baseline_when_selective"] > 1.2
    assert h["filtered_converges_to_baseline"]
    assert h["bloom_flat"]
    assert h["bloom_beats_baseline_at_none"]
