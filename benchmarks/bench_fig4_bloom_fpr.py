"""pytest-benchmark target regenerating Figure 4: bloom join vs false-positive rate.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig4_bloom_fpr.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig4_bloom_fpr as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig4_bloom_fpr(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, sf=BENCH_SF),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig4_bloom_fpr", 'Figure 4: bloom join vs false-positive rate', rows, exp.PAPER, h)
    assert h["sweet_spot_mid_range"]
    assert h["high_fpr_returns_more_bytes"]
