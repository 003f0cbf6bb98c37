"""pytest-benchmark target regenerating Figure 6: hybrid group-by S3/server split.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig6_hybrid_split.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig6_hybrid_split as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig6_hybrid_split(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, n_rows=BENCH_ROWS // 2),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig6_hybrid_split", 'Figure 6: hybrid group-by S3/server split', rows, exp.PAPER, h)
    assert h["best_split_in_sweet_spot"]
    assert h["s3_time_grows"]
    assert h["returned_bytes_shrink"]
