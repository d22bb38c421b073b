"""Synthetic stand-ins for the nine §4.5 multi-column tables (Fig 12).

TPC-H (lineitem, partsupp, orders), TPC-DS (inventory, catalog_sales,
date_dim) and three real-world-like tables (geo, stock, course_info).
Each table is generated as a pandas DataFrame of *numeric* columns only
(the benchmark considers numerical columns, §4.5), sorted by its
primary-key column, so non-key columns inherit serial patterns to varying
degrees — the "sortedness" effect the paper measures.  TPC-H generators
mirror the distributions of ``synth_data.py`` (the Spark-side TPC-H-lite);
tests cross-check the two.  Scale: ``n`` rows per table (paper tables are
6M–24M rows; shapes, not sizes, drive the codec comparison).
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def _g(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def t_lineitem(n: int, seed: int = 31) -> pd.DataFrame:
    g = _g(seed)
    n_orders = max(1, n // 4)
    df = pd.DataFrame(
        {
            "l_orderkey": np.sort(g.integers(1, n_orders + 1, n)),
            "l_partkey": g.integers(1, max(2, n // 30), n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n),
            "l_extendedprice": (g.random(n) * 9_000_000 + 90_000).astype(np.int64),
            "l_discount": (g.random(n) * 10).astype(np.int64),
            "l_tax": (g.random(n) * 8).astype(np.int64),
            "l_shipdate": 8000 + g.integers(0, 2557, n),
        }
    )
    return df


def t_partsupp(n: int, seed: int = 32) -> pd.DataFrame:
    g = _g(seed)
    n_part = max(1, n // 4)
    return pd.DataFrame(
        {
            "ps_partkey": np.sort(g.integers(1, n_part + 1, n)),
            "ps_suppkey": g.integers(1, max(2, n // 40), n),
            "ps_availqty": g.integers(1, 10_000, n),
            "ps_supplycost": (g.random(n) * 100_000).astype(np.int64),
        }
    )


def t_orders(n: int, seed: int = 33) -> pd.DataFrame:
    g = _g(seed)
    return pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, max(2, n // 10), n),
            "o_totalprice": (g.random(n) * 50_000_000 + 100_000).astype(np.int64),
            # order dates trail the (sorted) order keys with jitter — the
            # partial key correlation §4.5 attributes real tables
            "o_orderdate": 8000 + np.arange(n) * 2406 // max(1, n) + g.integers(-30, 31, n),
            "o_shippriority": np.zeros(n, dtype=np.int64),
        }
    )


def t_inventory(n: int, seed: int = 34) -> pd.DataFrame:
    """TPC-DS inventory: a dense cross-product (date × item × warehouse) —
    extremely regular, the paper's most-sortable table."""
    g = _g(seed)
    n_items = max(2, int(np.sqrt(n / 10)))
    n_wh = 10
    n_dates = max(2, n // (n_items * n_wh) + 1)
    date = np.repeat(np.arange(n_dates) * 7 + 36_890, n_items * n_wh)[:n]
    item = np.tile(np.repeat(np.arange(1, n_items + 1), n_wh), n_dates)[:n]
    wh = np.tile(np.arange(1, n_wh + 1), n_items * n_dates)[:n]
    return pd.DataFrame(
        {
            "inv_date_sk": date,
            "inv_item_sk": item,
            "inv_warehouse_sk": wh,
            "inv_quantity_on_hand": g.integers(0, 1000, n),
        }
    )


def t_catalog_sales(n: int, seed: int = 35) -> pd.DataFrame:
    g = _g(seed)
    return pd.DataFrame(
        {
            "cs_sold_date_sk": np.sort(g.integers(36_890, 38_716, n)),
            "cs_item_sk": g.integers(1, max(2, n // 50), n),
            "cs_order_number": np.sort(g.integers(1, max(2, n // 2), n)),
            "cs_quantity": g.integers(1, 100, n),
            "cs_wholesale_cost": (g.random(n) * 10_000).astype(np.int64),
            "cs_list_price": (g.random(n) * 30_000).astype(np.int64),
        }
    )


def t_date_dim(n: int, seed: int = 36) -> pd.DataFrame:
    """date_dim: one row per day — nearly every column is a pure function of
    the sorted key (very high sortedness)."""
    d = np.arange(n)
    return pd.DataFrame(
        {
            "d_date_sk": d + 2_415_022,
            "d_year": 1900 + d // 365,
            "d_moy": (d % 365) // 31 + 1,
            "d_dom": d % 31 + 1,
            "d_qoy": ((d % 365) // 92) + 1,
            "d_same_day_ly": d + 2_415_022 - 365,
        }
    )


def t_geo(n: int, seed: int = 37) -> pd.DataFrame:
    """GeoNames-like: ids sorted; lat/lon clustered by region."""
    g = _g(seed)
    region = np.sort(g.integers(0, 300, n))
    return pd.DataFrame(
        {
            "geonameid": np.cumsum(g.integers(1, 30, n)) + 1_000_000,
            "latitude_e4": (region * 500 + g.integers(0, 800, n) - 90_000),
            "longitude_e4": ((region * 1201) % 3600 * 100 + g.integers(0, 2000, n) - 180_000),
            "population": (g.pareto(1.5, n) * 1000).astype(np.int64),
            "elevation": g.integers(-100, 4000, n),
        }
    )


def t_stock(n: int, seed: int = 38) -> pd.DataFrame:
    """HistData-like FX ticks: sorted timestamps + random-walk prices."""
    g = _g(seed)
    ts = np.cumsum(g.integers(1, 120, n)) + 1_500_000_000
    px = 118_000 + np.cumsum(g.integers(-6, 7, n))
    return pd.DataFrame(
        {
            "ts": ts,
            "bid_e5": px,
            "ask_e5": px + g.integers(1, 9, n),
            "volume": g.integers(1, 500, n),
        }
    )


def t_course_info(n: int, seed: int = 39) -> pd.DataFrame:
    g = _g(seed)
    return pd.DataFrame(
        {
            "course_id": np.cumsum(g.integers(1, 2000, n)) + 1000,
            "price": g.choice([0, 1999, 2999, 4999, 9999, 19999], n),
            "num_subscribers": (g.pareto(1.2, n) * 100).astype(np.int64),
            "num_reviews": (g.pareto(1.3, n) * 10).astype(np.int64),
            "content_minutes": g.integers(30, 3000, n),
        }
    )


TABLES = {
    "lineitem": t_lineitem,
    "partsupp": t_partsupp,
    "orders": t_orders,
    "inventory": t_inventory,
    "catalog_sales": t_catalog_sales,
    "date_dim": t_date_dim,
    "geo": t_geo,
    "stock": t_stock,
    "course_info": t_course_info,
}

TPCH = ("lineitem", "partsupp", "orders")


def load_table(name: str, n: int) -> pd.DataFrame:
    return TABLES[name](n)
