"""Tests for the synthetic data generators (provided + extensions)."""
import numpy as np
import pytest

from repro import synth_data


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002).toPandas()


@pytest.fixture(scope="module")
def pt(spark):
    return synth_data.part(spark, sf=0.002).toPandas()


def test_lineitem_rows_scale(spark, li):
    assert len(li) == 12_000


def test_lineitem_has_tpch_extension_columns(li):
    assert "l_shipinstruct" in li.columns
    assert "l_shipmode" in li.columns


def test_lineitem_shipmode_domain(li):
    assert set(li["l_shipmode"]) <= {
        "REG AIR", "AIR", "RAIL", "SHIP", "TRUCK", "MAIL", "FOB"
    }


def test_lineitem_deterministic(spark, li):
    again = synth_data.lineitem(spark, sf=0.002).toPandas()
    assert (again["l_orderkey"] == li["l_orderkey"]).all()
    assert (again["l_extendedprice"] == li["l_extendedprice"]).all()


def test_orders_has_shippriority(spark):
    o = synth_data.orders(spark, sf=0.002).toPandas()
    assert (o["o_shippriority"] == 0).all()


def test_part_container_domain(pt):
    assert "MED BOX" in set(pt["p_container"])
    assert all(" " in c for c in pt["p_container"])


def test_part_brand_q19_constants_exist(pt):
    assert {"Brand#12", "Brand#23", "Brand#34"} <= set(pt["p_brand"])


def test_customer_acctbal_range(spark):
    c = synth_data.customer(spark, sf=0.002).toPandas()
    assert c["c_acctbal"].min() >= -1000
    assert c["c_acctbal"].max() < 9000


def test_filter_table_uniform_selectivity(spark):
    ft = synth_data.filter_table(spark, n=50_000).toPandas()
    sel = (ft["u"] < 0.01).mean()
    assert 0.005 < sel < 0.02  # ~1%


def test_filter_table_ids_unique(spark):
    ft = synth_data.filter_table(spark, n=1000).toPandas()
    assert ft["id"].is_unique


def test_groups_table_uniform_group_counts(spark):
    gt = synth_data.groups_table(spark, n=20_000, kind="uniform").toPandas()
    for i in (1, 3, 5):
        assert gt[f"g{i}"].nunique() == 2 ** i


def test_groups_table_uniform_sizes_balanced(spark):
    gt = synth_data.groups_table(spark, n=20_000, kind="uniform").toPandas()
    counts = gt["g2"].value_counts()
    assert counts.max() / counts.min() < 1.3


def test_groups_table_zipf_skew(spark):
    gt = synth_data.groups_table(spark, n=20_000, kind="zipf", theta=1.3).toPandas()
    top4 = gt["g1"].value_counts().head(4).sum() / len(gt)
    # Paper: theta=1.3 -> 59% of rows in the 4 largest groups.
    assert 0.45 < top4 < 0.75


def test_groups_table_zipf_theta_zero_uniform(spark):
    gt = synth_data.groups_table(spark, n=50_000, kind="zipf", theta=0.0).toPandas()
    counts = gt["g1"].value_counts()
    assert counts.max() / counts.min() < 1.6


def test_groups_table_bad_kind(spark):
    with pytest.raises(ValueError):
        synth_data.groups_table(spark, n=10, kind="nope").toPandas()


def test_wide_table_columns(spark):
    wt = synth_data.wide_table(spark, n=1000, n_cols=10).toPandas()
    assert list(wt.columns) == [f"c{i}" for i in range(1, 11)]


def test_wide_table_precision(spark):
    wt = synth_data.wide_table(spark, n=1000, n_cols=1).toPandas()
    assert np.allclose(wt["c1"], wt["c1"].round(4))


def test_zipf_weights_normalized():
    w = synth_data._zipf_weights(100, 1.1)
    assert w.sum() == pytest.approx(1.0)
    assert (np.diff(w) <= 0).all()  # decreasing in rank
