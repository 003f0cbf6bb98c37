"""pytest-benchmark target regenerating Figure 8: sampling top-K vs sample size.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig8_topk_sample.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig8_topk_sample as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig8_topk_sample(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, sf=BENCH_SF),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig8_topk_sample", 'Figure 8: sampling top-K vs sample size', rows, exp.PAPER, h)
    assert h["sample_time_grows"]
    assert h["scan_time_shrinks"]
    assert h["best_within_10x_of_model"]
