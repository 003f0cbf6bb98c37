"""pytest-benchmark target regenerating Figure 9: top-K vs K.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig9_topk_k.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig9_topk_k as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig9_topk_k(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, sf=BENCH_SF),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig9_topk_k", 'Figure 9: top-K vs K', rows, exp.PAPER, h)
    assert h["sampling_always_faster"]
    assert h["sampling_always_cheaper"]
