"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ==========================================================================
# PyTond reproduction extensions: full TPC-H-lite (8 tables, all columns the
# 22 queries touch), workload datasets and dense/sparse matrix generators.
# All generators are deterministic in ``seed`` and return *pandas* frames
# (``*_spark`` wrappers create Spark frames); the Pandas baseline, DuckDB
# and Spark therefore see byte-identical input.
# ==========================================================================

_NATIONS = [
    ("ALGERIA", 0), ("ARGENTINA", 1), ("BRAZIL", 1), ("CANADA", 1),
    ("EGYPT", 4), ("ETHIOPIA", 0), ("FRANCE", 3), ("GERMANY", 3),
    ("INDIA", 2), ("INDONESIA", 2), ("IRAN", 4), ("IRAQ", 4),
    ("JAPAN", 2), ("JORDAN", 4), ("KENYA", 0), ("MOROCCO", 0),
    ("MOZAMBIQUE", 0), ("PERU", 1), ("CHINA", 2), ("ROMANIA", 3),
    ("SAUDI ARABIA", 4), ("VIETNAM", 2), ("RUSSIA", 3),
    ("UNITED KINGDOM", 3), ("UNITED STATES", 1),
]
_REGIONS = ["AFRICA", "AMERICA", "ASIA", "EUROPE", "MIDDLE EAST"]
_SEGMENTS = ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"]
_PRIORITIES = ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT SPECIFIED", "5-LOW"]
_SHIPMODES = ["REG AIR", "AIR", "RAIL", "SHIP", "TRUCK", "MAIL", "FOB"]
_SHIPINSTRUCT = ["DELIVER IN PERSON", "COLLECT COD", "NONE", "TAKE BACK RETURN"]
_CONTAINERS = [
    f"{a} {b}" for a in ["SM", "MED", "LG", "JUMBO", "WRAP"]
    for b in ["CASE", "BOX", "BAG", "JAR", "PKG", "PACK", "CAN", "DRUM"]
]
_TYPE_1 = ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"]
_TYPE_2 = ["ANODIZED", "BURNISHED", "PLATED", "POLISHED", "BRUSHED"]
_TYPE_3 = ["TIN", "NICKEL", "BRASS", "STEEL", "COPPER"]
_P_NAMES = [
    "goldenrod green lavender spring", "blush thistle blue yellow",
    "spring green yellow purple", "cornflower chocolate smoke",
    "forest brown coral puff", "forest blush chiffon thistle",
    "moccasin green thistle khaki", "green blush tomato burlywood",
    "peru saddle burnished black", "linen pink seashell salmon",
    "spring forest almond antique", "misty red orange frosted",
]
_COMMENT_WORDS = [
    "carefully", "quickly", "furiously", "special", "requests", "deposits",
    "accounts", "pending", "final", "regular", "express", "ironic", "bold",
    "Customer", "Complaints", "packages", "theodolites", "instructions",
]

_N_SUPPLIER_PER_SF = 10_000
_N_PARTSUPP_PER_SF = 800_000


def _comment(g, n):
    w = g.choice(_COMMENT_WORDS, size=(n, 4))
    return [" ".join(row) for row in w]


def tpch_tables(sf: float = 0.01, seed: int = 0) -> dict:
    """Full TPC-H-lite dataset as pandas frames (8 tables).

    dbgen is unavailable offline; this generator matches the TPC-H schema
    and value domains (dates 1992-1998, shares of PROMO types, comment
    tokens used by query predicates, etc.) at a configurable scale factor.
    """
    g = _rng(seed)
    n_li = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_o = max(1, int(_N_ORDERS_PER_SF * sf))
    n_c = max(1, int(_N_CUSTOMER_PER_SF * sf))
    n_p = max(1, int(_N_PART_PER_SF * sf))
    n_s = max(3, int(_N_SUPPLIER_PER_SF * sf))
    n_ps = max(4, int(_N_PARTSUPP_PER_SF * sf))

    region = pd.DataFrame({
        "r_regionkey": np.arange(5),
        "r_name": _REGIONS,
        "r_comment": _comment(g, 5),
    })
    nation = pd.DataFrame({
        "n_nationkey": np.arange(25),
        "n_name": [n for n, _ in _NATIONS],
        "n_regionkey": [r for _, r in _NATIONS],
        "n_comment": _comment(g, 25),
    })
    supplier = pd.DataFrame({
        "s_suppkey": np.arange(1, n_s + 1),
        "s_name": [f"Supplier#{i:09d}" for i in range(1, n_s + 1)],
        "s_address": [f"addr{i}" for i in range(n_s)],
        "s_nationkey": g.integers(0, 25, n_s),
        "s_phone": [f"{g.integers(10, 35)}-{i % 900 + 100}-{i % 9000 + 1000}" for i in range(n_s)],
        "s_acctbal": (g.random(n_s) * 10000 - 1000).round(2),
        "s_comment": _comment(g, n_s),
    })
    customer = pd.DataFrame({
        "c_custkey": np.arange(1, n_c + 1),
        "c_name": [f"Customer#{i:09d}" for i in range(1, n_c + 1)],
        "c_address": [f"addr{i}" for i in range(n_c)],
        "c_nationkey": g.integers(0, 25, n_c),
        "c_phone": [f"{cc}-{i % 900 + 100}-{i % 9000 + 1000}"
                    for cc, i in zip(g.integers(10, 35, n_c), range(n_c))],
        "c_acctbal": (g.random(n_c) * 10000 - 1000).round(2),
        "c_mktsegment": g.choice(_SEGMENTS, n_c),
        "c_comment": _comment(g, n_c),
    })
    part = pd.DataFrame({
        "p_partkey": np.arange(1, n_p + 1),
        "p_name": g.choice(_P_NAMES, n_p),
        "p_mfgr": [f"Manufacturer#{i}" for i in g.integers(1, 6, n_p)],
        "p_brand": [f"Brand#{i}{j}" for i, j in zip(g.integers(1, 6, n_p), g.integers(1, 6, n_p))],
        "p_type": [f"{a} {b} {c}" for a, b, c in zip(
            g.choice(_TYPE_1, n_p), g.choice(_TYPE_2, n_p), g.choice(_TYPE_3, n_p))],
        "p_size": g.integers(1, 51, n_p),
        "p_container": g.choice(_CONTAINERS, n_p),
        "p_retailprice": (900 + (np.arange(1, n_p + 1) % 1000) / 10.0).round(2),
        "p_comment": _comment(g, n_p),
    })
    partsupp = pd.DataFrame({
        "ps_partkey": g.integers(1, n_p + 1, n_ps),
        "ps_suppkey": g.integers(1, n_s + 1, n_ps),
        "ps_availqty": g.integers(1, 10000, n_ps),
        "ps_supplycost": (g.random(n_ps) * 1000 + 1).round(2),
        "ps_comment": _comment(g, n_ps),
    }).drop_duplicates(["ps_partkey", "ps_suppkey"]).reset_index(drop=True)
    odate = pd.to_datetime("1992-01-01") + pd.to_timedelta(g.integers(0, 2406, n_o), unit="D")
    orders = pd.DataFrame({
        "o_orderkey": np.arange(1, n_o + 1),
        "o_custkey": g.integers(1, n_c + 1, n_o),
        "o_orderstatus": g.choice(list("OFP"), n_o),
        "o_totalprice": (g.random(n_o) * 500000 + 1000).round(2),
        "o_orderdate": odate,
        "o_orderpriority": g.choice(_PRIORITIES, n_o),
        "o_clerk": [f"Clerk#{i:09d}" for i in g.integers(1, 1001, n_o)],
        "o_shippriority": np.zeros(n_o, dtype="int64"),
        "o_comment": _comment(g, n_o),
    })
    okeys = g.integers(1, n_o + 1, n_li)
    ship_off = g.integers(1, 122, n_li)
    commit_off = g.integers(30, 91, n_li)
    receipt_off = g.integers(1, 31, n_li)
    shipdate = odate.values[okeys - 1] + ship_off.astype("timedelta64[D]")
    lineitem = pd.DataFrame({
        "l_orderkey": okeys,
        "l_partkey": g.integers(1, n_p + 1, n_li),
        "l_suppkey": g.integers(1, n_s + 1, n_li),
        "l_linenumber": g.integers(1, 8, n_li),
        "l_quantity": g.integers(1, 51, n_li).astype("float64"),
        "l_extendedprice": (g.random(n_li) * 90000 + 900).round(2),
        "l_discount": (g.integers(0, 11, n_li) / 100.0),
        "l_tax": (g.integers(0, 9, n_li) / 100.0),
        "l_returnflag": g.choice(list("NRA"), n_li),
        "l_linestatus": g.choice(list("OF"), n_li),
        "l_shipdate": pd.DatetimeIndex(shipdate),
        "l_commitdate": pd.DatetimeIndex(odate.values[okeys - 1] + commit_off.astype("timedelta64[D]")),
        "l_receiptdate": pd.DatetimeIndex(shipdate + receipt_off.astype("timedelta64[D]")),
        "l_shipinstruct": g.choice(_SHIPINSTRUCT, n_li),
        "l_shipmode": g.choice(_SHIPMODES, n_li),
        "l_comment": _comment(g, n_li),
    })
    return {
        "region": region, "nation": nation, "supplier": supplier,
        "customer": customer, "part": part, "partsupp": partsupp,
        "orders": orders, "lineitem": lineitem,
    }


# --------------------------------------------------------------------------
# Workload datasets (paper Section V-A; synthetic substitutes, see DESIGN.md)
# --------------------------------------------------------------------------


def crime_data(n: int = 100_000, seed: int = 7) -> pd.DataFrame:
    """Crime Index notebook input: per-city population/crime columns."""
    g = _rng(seed)
    total = g.integers(1_000, 2_000_000, n).astype("float64")
    return pd.DataFrame({
        "city_id": np.arange(n, dtype="int64"),
        "total_population": total,
        "adult_population": (total * (0.6 + 0.3 * g.random(n))).round(0),
        "num_robberies": (total * 0.002 * g.random(n)).round(0),
    })


def births_data(n: int = 200_000, seed: int = 8) -> pd.DataFrame:
    """Birth Analysis input: (year, name, sex, births)."""
    g = _rng(seed)
    names = [f"name{i:04d}" for i in range(500)]
    return pd.DataFrame({
        "year": g.integers(1880, 2011, n),
        "name": g.choice(names, n),
        "sex": g.choice(["F", "M"], n),
        "births": g.integers(1, 5000, n).astype("int64"),
    })


def flights_data(n: int = 500_000, seed: int = 9) -> pd.DataFrame:
    """Kaggle N3 substitute: airline on-time performance records."""
    g = _rng(seed)
    carriers = ["AA", "DL", "UA", "WN", "B6", "AS", "NK", "F9", "HA", "G4"]
    airports = [f"AP{i:03d}" for i in range(200)]
    return pd.DataFrame({
        "flight_id": np.arange(n, dtype="int64"),
        "carrier": g.choice(carriers, n),
        "origin": g.choice(airports, n),
        "dest": g.choice(airports, n),
        "month": g.integers(1, 13, n),
        "day_of_week": g.integers(1, 8, n),
        "dep_delay": (g.normal(8, 25, n)).round(1),
        "arr_delay": (g.normal(6, 28, n)).round(1),
        "distance": g.integers(100, 3000, n).astype("float64"),
        "cancelled": (g.random(n) < 0.02).astype("int64"),
    })


def ecommerce_data(n: int = 300_000, seed: int = 10) -> dict:
    """Kaggle N9 substitute: e-commerce order lines + product dimension."""
    g = _rng(seed)
    n_prod = 2_000
    products = pd.DataFrame({
        "product_id": np.arange(1, n_prod + 1),
        "category": g.choice(["electronics", "clothing", "home", "sports", "toys",
                              "beauty", "garden", "auto"], n_prod),
        "unit_price": (g.random(n_prod) * 500 + 1).round(2),
    })
    sales = pd.DataFrame({
        "order_id": g.integers(1, n // 3 + 1, n),
        "product_id": g.integers(1, n_prod + 1, n),
        "quantity": g.integers(1, 10, n).astype("int64"),
        "discount": (g.integers(0, 5, n) / 10.0),
        "month": g.integers(1, 13, n),
        "returned": (g.random(n) < 0.05).astype("int64"),
    })
    return {"sales": sales, "products": products}


def hybrid_tables(n_left: int = 200_000, n_right: int = 50_000,
                  n_feats: int = 4, seed: int = 11) -> dict:
    """Hybrid matrix workloads: two joinable tables with numeric features."""
    g = _rng(seed)
    right = pd.DataFrame({"rkey": np.arange(1, n_right + 1)})
    for i in range(n_feats // 2):
        right[f"rf{i}"] = (g.random(n_right) * 10).round(4)
    left = pd.DataFrame({
        "lkey": g.integers(1, n_right + 1, n_left),
        "lval": (g.random(n_left) * 100).round(4),
    })
    for i in range(n_feats - n_feats // 2):
        left[f"lf{i}"] = (g.random(n_left) * 10).round(4)
    return {"tleft": left, "tright": right}


# --------------------------------------------------------------------------
# Matrix generators for the covariance micro-benchmark (paper Fig. 9)
# --------------------------------------------------------------------------


def dense_matrix(n_rows: int, n_cols: int, sparsity_pct: float = 100.0,
                 seed: int = 12) -> np.ndarray:
    """Random matrix; ``sparsity_pct`` is the percentage of non-zeros."""
    g = _rng(seed)
    m = g.random((n_rows, n_cols))
    if sparsity_pct < 100.0:
        mask = g.random((n_rows, n_cols)) < (sparsity_pct / 100.0)
        m = m * mask
    return m


def dense_matrix_table(m: np.ndarray) -> pd.DataFrame:
    """Dense layout relation: (id, c0..c{n-1})."""
    out = {"id": np.arange(m.shape[0], dtype="int64")}
    for j in range(m.shape[1]):
        out[f"c{j}"] = m[:, j]
    return pd.DataFrame(out)


def coo_matrix_table(m: np.ndarray) -> pd.DataFrame:
    """Sparse COO layout relation: (row, col, val) for non-zero cells."""
    r, c = np.nonzero(m)
    return pd.DataFrame({
        "row": r.astype("int64"), "col": c.astype("int64"), "val": m[r, c]
    })
