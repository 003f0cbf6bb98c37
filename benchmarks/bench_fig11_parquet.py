"""pytest-benchmark target regenerating Figure 11: CSV vs Parquet.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig11_parquet.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig11_parquet as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig11_parquet(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, n_rows=BENCH_ROWS // 2),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig11_parquet", 'Figure 11: CSV vs Parquet', rows, exp.PAPER, h)
    assert h["parquet_wins_wide_selective"]
    assert h["advantage_fades_with_selectivity"]
    assert h["narrow_table_close"]
