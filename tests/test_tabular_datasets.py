"""Tabular data-set generator tests (Fig 12 substrate) + synth_data checks."""
import numpy as np
import pytest

from repro.datasets_tabular import TABLES, TPCH, load_table


@pytest.mark.parametrize("name", list(TABLES))
def test_tables_generate(name):
    df = load_table(name, 3000)
    assert len(df) == 3000
    assert len(df.columns) >= 4
    for c in df.columns:
        assert np.issubdtype(df[c].dtype, np.integer), f"{name}.{c} must be numeric"


@pytest.mark.parametrize("name", list(TABLES))
def test_tables_deterministic(name):
    a, b = load_table(name, 1000), load_table(name, 1000)
    assert a.equals(b)


def test_tpch_tables_listed():
    assert set(TPCH) <= set(TABLES)


def test_primary_keys_sorted_after_sort():
    for name in TABLES:
        df = load_table(name, 2000)
        pk = df.columns[0]
        v = df.sort_values(pk)[pk].to_numpy()
        assert (np.diff(v) >= 0).all()


def test_date_dim_is_functionally_correlated():
    df = load_table("date_dim", 2000)
    # d_year is a pure function of the sorted key → perfectly sorted
    assert (np.diff(df.d_year.to_numpy()) >= 0).all()


def test_inventory_is_periodic():
    df = load_table("inventory", 3000)
    assert (np.diff(df.inv_date_sk.to_numpy()) >= 0).all()
    assert df.inv_warehouse_sk.max() <= 10


def test_stock_prices_are_random_walk():
    df = load_table("stock", 3000)
    d = np.diff(df.bid_e5.to_numpy())
    assert abs(d.mean()) < 2 and d.std() < 10


def test_lineitem_matches_spark_generator_distributions(spark):
    """The pandas TPC-H-lite mirrors synth_data's Spark TPC-H-lite ranges."""
    from repro import synth_data

    sdf = synth_data.lineitem(spark, sf=0.002).toPandas()
    pdf = load_table("lineitem", len(sdf))
    assert pdf.l_quantity.between(1, 50).all() and sdf.l_quantity.between(1, 50).all()
    assert pdf.l_linenumber.between(1, 7).all() and sdf.l_linenumber.between(1, 7).all()
