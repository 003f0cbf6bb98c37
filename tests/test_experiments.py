"""Smoke + shape tests for the figure experiments at reduced scale.

Each experiment runs with small tables/sweeps; we assert the *shape*
claims the paper makes (who wins, where it degrades), not absolute
numbers. Full-scale sweeps live in benchmarks/.
"""
import pytest

from repro.experiments import (
    common, fig1_filter, fig2_join_customer, fig3_join_orders, fig4_bloom_fpr,
    fig5_groupby_uniform, fig6_hybrid_split, fig7_groupby_skew,
    fig8_topk_sample, fig9_topk_k, fig10_tpch, fig11_parquet,
)

SF = 0.01


@pytest.fixture(scope="module")
def exp_store(tmp_path_factory):
    from repro.s3sim import ObjectStore

    return ObjectStore(tmp_path_factory.mktemp("experiments"))


def test_fig1_shapes(spark, exp_store):
    rows = fig1_filter.run(
        spark, exp_store, n_rows=30_000, selectivities=(1e-4, 1e-2)
    )
    h = fig1_filter.headline(rows)
    assert h["s3_vs_server_speedup_at_high_selectivity"] > 3.0
    assert h["s3_over_server_cost_ratio"] > 1.0  # s3-side costs more
    assert h["index_fast_at_high_selectivity"]
    assert h["index_collapses_at_low_selectivity"]
    assert h["index_cost_advantage_at_high_selectivity"] > 1.0


def test_fig2_shapes(spark, exp_store):
    rows = fig2_join_customer.run(spark, exp_store, sf=SF, sweep=(-950, -450))
    h = fig2_join_customer.headline(rows)
    assert h["bloom_speedup_vs_baseline_at_high_selectivity"] > 1.3
    assert h["baseline_filtered_similar"]


def test_fig3_shapes(spark, exp_store):
    rows = fig3_join_orders.run(
        spark, exp_store, sf=SF, sweep=("1992-06-01", None)
    )
    h = fig3_join_orders.headline(rows)
    assert h["filtered_speedup_vs_baseline_when_selective"] > 1.2
    assert h["filtered_converges_to_baseline"]
    assert h["bloom_flat"]
    assert h["bloom_beats_baseline_at_none"]


def test_fig4_shapes(spark, exp_store):
    rows = fig4_bloom_fpr.run(spark, exp_store, sf=SF, fprs=(0.0001, 0.01, 0.5))
    h = fig4_bloom_fpr.headline(rows)
    assert h["high_fpr_returns_more_bytes"]
    blooms = [r for r in rows if r["algo"] == "bloom"]
    refs = [r for r in rows if r["algo"] != "bloom"]
    assert min(b["runtime_s_10gb"] for b in blooms) < min(
        r["runtime_s_10gb"] for r in refs
    )


def test_fig5_shapes(spark, exp_store):
    rows = fig5_groupby_uniform.run(
        spark, exp_store, n_rows=30_000, group_counts=(2, 32)
    )
    h = fig5_groupby_uniform.headline(rows)
    assert h["filtered_speedup_vs_server"] > 1.2
    assert h["s3_speedup_vs_filtered_at_2_groups"] > 1.0
    assert h["s3_degrades_with_groups"]
    assert h["server_filtered_flat"]


def test_fig6_shapes(spark, exp_store):
    rows = fig6_hybrid_split.run(spark, exp_store, n_rows=30_000, splits=(0, 4, 10))
    h = fig6_hybrid_split.headline(rows)
    assert h["s3_time_grows"]
    assert h["returned_bytes_shrink"]


def test_fig7_shapes(spark, exp_store):
    rows = fig7_groupby_skew.run(spark, exp_store, n_rows=30_000, thetas=(0.0, 1.3))
    h = fig7_groupby_skew.headline(rows)
    assert h["hybrid_wins_at_high_skew"]
    assert h["filtered_flat"]


def test_fig8_shapes(spark, exp_store):
    rows = fig8_topk_sample.run(
        spark, exp_store, sf=SF, k=100, sweep=(500, 5000, 25000)
    )
    h = fig8_topk_sample.headline(rows)
    assert h["sample_time_grows"]
    assert h["scan_time_shrinks"]
    assert h["best_within_10x_of_model"]


def test_fig9_shapes(spark, exp_store):
    rows = fig9_topk_k.run(spark, exp_store, sf=SF, sweep=(1, 100))
    h = fig9_topk_k.headline(rows)
    assert h["sampling_always_faster"]
    assert h["sampling_always_cheaper"]


def test_fig10_shapes(spark, exp_store):
    rows = fig10_tpch.run(spark, exp_store, sf=SF, queries=("q1", "q6", "q14"))
    h = fig10_tpch.headline(rows)
    assert h["optimized_faster_on_geomean"]
    assert h["geomean_speedup"] > 1.5
    # cost parity or better at geo-mean (paper: 30% cheaper)
    assert h["geomean_cost_ratio"] < 1.2


def test_fig11_shapes(spark, exp_store):
    rows = fig11_parquet.run(
        spark, exp_store, n_rows=30_000, n_cols_sweep=(1, 20),
        selectivities=(0.0, 1.0),
    )
    h = fig11_parquet.headline(rows)
    assert h["parquet_wins_wide_selective"]
    assert h["advantage_fades_with_selectivity"]
    assert h["narrow_table_close"]


def test_result_row_contains_both_scales(spark, exp_store):
    rows = fig9_topk_k.run(spark, exp_store, sf=SF, sweep=(1,))
    for r in rows:
        assert {"runtime_s", "runtime_s_10gb", "cost_usd", "cost_usd_10gb"} <= set(r)


def test_format_rows_renders():
    txt = common.format_rows([{"a": 1, "b": "x"}, {"a": 22, "b": "yy"}])
    assert "a" in txt and "22" in txt


def test_geomean():
    assert common.geomean([1, 4]) == pytest.approx(2.0)
    assert common.geomean([]) != common.geomean([])  # nan for empty
