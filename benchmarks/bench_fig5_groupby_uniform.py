"""pytest-benchmark target regenerating Figure 5: group-by vs number of groups.

The benchmark measures one full sweep (pedantic, single round -- a sweep
is minutes of work, not microseconds); the figure's rows are printed and
saved to benchmarks/results/fig5_groupby_uniform.json, and the paper's qualitative
claims are asserted on the measured rows.
"""
from repro.experiments import fig5_groupby_uniform as exp

from .conftest import BENCH_ROWS, BENCH_SF, record


def test_fig5_groupby_uniform(benchmark, spark, bench_store):
    rows = benchmark.pedantic(
        lambda: exp.run(spark, bench_store, n_rows=BENCH_ROWS // 2),
        rounds=1, iterations=1,
    )
    h = exp.headline(rows)
    record("fig5_groupby_uniform", 'Figure 5: group-by vs number of groups', rows, exp.PAPER, h)
    assert h["filtered_speedup_vs_server"] > 1.2
    assert h["s3_speedup_vs_filtered_at_2_groups"] > 1.0
    assert h["s3_degrades_with_groups"]
    assert h["server_filtered_flat"]
