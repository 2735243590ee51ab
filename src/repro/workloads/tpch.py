"""All 22 TPC-H queries written in the Pandas subset PyTond captures.

These are the paper's TPC-H workload (Section V-A, from the Pandas TPC-H
suite of [34]); each function is both the *Python baseline* (call it with
pandas frames) and the input to the PyTond compiler. Functions only use
APIs covered by the frontend: filtering, boolean masks, merge, groupby +
named aggregation, isin, sort_values/head, str/dt accessors, np.where and
scalar aggregates.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.api import pytond
from repro.core.catalog import Catalog, TableSchema


def tpch_catalog() -> Catalog:
    """Schemas + primary-key facts of the 8 TPC-H relations (the paper pulls
    these from the DBMS catalog; lineitem/partsupp keys reflect the synth
    generator: partsupp is deduplicated, lineitem has no unique key)."""
    cat = Catalog()
    cols = {
        "region": ("r_regionkey", "r_name", "r_comment"),
        "nation": ("n_nationkey", "n_name", "n_regionkey", "n_comment"),
        "supplier": ("s_suppkey", "s_name", "s_address", "s_nationkey",
                     "s_phone", "s_acctbal", "s_comment"),
        "customer": ("c_custkey", "c_name", "c_address", "c_nationkey",
                     "c_phone", "c_acctbal", "c_mktsegment", "c_comment"),
        "part": ("p_partkey", "p_name", "p_mfgr", "p_brand", "p_type",
                 "p_size", "p_container", "p_retailprice", "p_comment"),
        "partsupp": ("ps_partkey", "ps_suppkey", "ps_availqty",
                     "ps_supplycost", "ps_comment"),
        "orders": ("o_orderkey", "o_custkey", "o_orderstatus", "o_totalprice",
                   "o_orderdate", "o_orderpriority", "o_clerk",
                   "o_shippriority", "o_comment"),
        "lineitem": ("l_orderkey", "l_partkey", "l_suppkey", "l_linenumber",
                     "l_quantity", "l_extendedprice", "l_discount", "l_tax",
                     "l_returnflag", "l_linestatus", "l_shipdate",
                     "l_commitdate", "l_receiptdate", "l_shipinstruct",
                     "l_shipmode", "l_comment"),
    }
    pks = {
        "region": [["r_regionkey"]], "nation": [["n_nationkey"]],
        "supplier": [["s_suppkey"]], "customer": [["c_custkey"]],
        "part": [["p_partkey"]], "partsupp": [["ps_partkey", "ps_suppkey"]],
        "orders": [["o_orderkey"]], "lineitem": [],
    }
    for name, c in cols.items():
        cat.add(TableSchema(name, c, tuple(frozenset(u) for u in pks[name])))
    return cat


@pytond()
def q01(lineitem):
    d = lineitem[lineitem.l_shipdate <= pd.Timestamp("1998-09-02")].copy()
    d["disc_price"] = d.l_extendedprice * (1 - d.l_discount)
    d["charge"] = d.l_extendedprice * (1 - d.l_discount) * (1 + d.l_tax)
    r = d.groupby(["l_returnflag", "l_linestatus"], as_index=False).agg(
        sum_qty=("l_quantity", "sum"), sum_base_price=("l_extendedprice", "sum"),
        sum_disc_price=("disc_price", "sum"), sum_charge=("charge", "sum"),
        avg_qty=("l_quantity", "mean"), avg_price=("l_extendedprice", "mean"),
        avg_disc=("l_discount", "mean"), count_order=("l_quantity", "count"))
    return r.sort_values(["l_returnflag", "l_linestatus"])


@pytond()
def q02(part, supplier, partsupp, nation, region):
    p = part[(part.p_size == 15) & (part.p_type.str.endswith("BRASS"))]
    r = region[region.r_name == "EUROPE"]
    n = nation.merge(r, left_on="n_regionkey", right_on="r_regionkey")
    s = supplier.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    ps = partsupp.merge(p, left_on="ps_partkey", right_on="p_partkey")
    ps = ps.merge(s, left_on="ps_suppkey", right_on="s_suppkey")
    mincost = ps.groupby(["ps_partkey"], as_index=False).agg(
        min_cost=("ps_supplycost", "min"))
    j = ps.merge(mincost, on="ps_partkey")
    j = j[j.ps_supplycost == j.min_cost]
    out = j[["s_acctbal", "s_name", "n_name", "p_partkey", "p_mfgr",
             "s_address", "s_phone", "s_comment"]]
    return out.sort_values(["s_acctbal", "n_name", "s_name", "p_partkey"],
                           ascending=[False, True, True, True]).head(100)


@pytond()
def q03(customer, orders, lineitem):
    c = customer[customer.c_mktsegment == "BUILDING"]
    o = orders[orders.o_orderdate < pd.Timestamp("1995-03-15")]
    li = lineitem[lineitem.l_shipdate > pd.Timestamp("1995-03-15")]
    j = c.merge(o, left_on="c_custkey", right_on="o_custkey")
    j = j.merge(li, left_on="o_orderkey", right_on="l_orderkey")
    j["revenue"] = j.l_extendedprice * (1 - j.l_discount)
    r = j.groupby(["l_orderkey", "o_orderdate", "o_shippriority"],
                  as_index=False).agg(revenue=("revenue", "sum"))
    return r.sort_values(["revenue", "o_orderdate"],
                         ascending=[False, True]).head(10)


@pytond()
def q04(orders, lineitem):
    li = lineitem[lineitem.l_commitdate < lineitem.l_receiptdate]
    o = orders[(orders.o_orderdate >= pd.Timestamp("1993-07-01")) &
               (orders.o_orderdate < pd.Timestamp("1993-10-01"))]
    o = o[o.o_orderkey.isin(li.l_orderkey)]
    r = o.groupby(["o_orderpriority"], as_index=False).agg(
        order_count=("o_orderkey", "count"))
    return r.sort_values(["o_orderpriority"])


@pytond()
def q05(customer, orders, lineitem, supplier, nation, region):
    r = region[region.r_name == "ASIA"]
    n = nation.merge(r, left_on="n_regionkey", right_on="r_regionkey")
    c = customer.merge(n, left_on="c_nationkey", right_on="n_nationkey")
    o = orders[(orders.o_orderdate >= pd.Timestamp("1994-01-01")) &
               (orders.o_orderdate < pd.Timestamp("1995-01-01"))]
    j = c.merge(o, left_on="c_custkey", right_on="o_custkey")
    j = j.merge(lineitem, left_on="o_orderkey", right_on="l_orderkey")
    j = j.merge(supplier, left_on="l_suppkey", right_on="s_suppkey")
    j = j[j.c_nationkey == j.s_nationkey]
    j["revenue"] = j.l_extendedprice * (1 - j.l_discount)
    res = j.groupby(["n_name"], as_index=False).agg(revenue=("revenue", "sum"))
    return res.sort_values(["revenue"], ascending=False)


@pytond()
def q06(lineitem):
    d = lineitem[(lineitem.l_shipdate >= pd.Timestamp("1994-01-01")) &
                 (lineitem.l_shipdate < pd.Timestamp("1995-01-01")) &
                 (lineitem.l_discount.between(0.05, 0.07)) &
                 (lineitem.l_quantity < 24)]
    return (d.l_extendedprice * d.l_discount).sum()


@pytond()
def q07(supplier, lineitem, orders, customer, nation):
    n1 = nation.rename(columns={"n_nationkey": "n1_key", "n_name": "supp_nation",
                                "n_regionkey": "n1_rk", "n_comment": "n1_c"})
    n2 = nation.rename(columns={"n_nationkey": "n2_key", "n_name": "cust_nation",
                                "n_regionkey": "n2_rk", "n_comment": "n2_c"})
    j = supplier.merge(n1, left_on="s_nationkey", right_on="n1_key")
    j = j.merge(lineitem, left_on="s_suppkey", right_on="l_suppkey")
    j = j.merge(orders, left_on="l_orderkey", right_on="o_orderkey")
    j = j.merge(customer, left_on="o_custkey", right_on="c_custkey")
    j = j.merge(n2, left_on="c_nationkey", right_on="n2_key")
    j = j[((j.supp_nation == "FRANCE") & (j.cust_nation == "GERMANY")) |
          ((j.supp_nation == "GERMANY") & (j.cust_nation == "FRANCE"))]
    j = j[(j.l_shipdate >= pd.Timestamp("1995-01-01")) &
          (j.l_shipdate <= pd.Timestamp("1996-12-31"))]
    j["l_year"] = j.l_shipdate.dt.year
    j["volume"] = j.l_extendedprice * (1 - j.l_discount)
    r = j.groupby(["supp_nation", "cust_nation", "l_year"],
                  as_index=False).agg(revenue=("volume", "sum"))
    return r.sort_values(["supp_nation", "cust_nation", "l_year"])


@pytond()
def q08(part, supplier, lineitem, orders, customer, nation, region):
    p = part[part.p_type == "ECONOMY ANODIZED STEEL"]
    r = region[region.r_name == "AMERICA"]
    n1 = nation.merge(r, left_on="n_regionkey", right_on="r_regionkey")
    n2 = nation.rename(columns={"n_nationkey": "n2_key", "n_name": "nation_name",
                                "n_regionkey": "n2_rk", "n_comment": "n2_c"})
    o = orders[(orders.o_orderdate >= pd.Timestamp("1995-01-01")) &
               (orders.o_orderdate <= pd.Timestamp("1996-12-31"))]
    j = p.merge(lineitem, left_on="p_partkey", right_on="l_partkey")
    j = j.merge(o, left_on="l_orderkey", right_on="o_orderkey")
    j = j.merge(customer, left_on="o_custkey", right_on="c_custkey")
    j = j.merge(n1, left_on="c_nationkey", right_on="n_nationkey")
    j = j.merge(supplier, left_on="l_suppkey", right_on="s_suppkey")
    j = j.merge(n2, left_on="s_nationkey", right_on="n2_key")
    j["o_year"] = j.o_orderdate.dt.year
    j["volume"] = j.l_extendedprice * (1 - j.l_discount)
    j["brazil_volume"] = np.where(j.nation_name == "BRAZIL", j.volume, 0.0)
    r2 = j.groupby(["o_year"], as_index=False).agg(
        brazil=("brazil_volume", "sum"), total=("volume", "sum"))
    r2["mkt_share"] = r2.brazil / r2.total
    out = r2[["o_year", "mkt_share"]]
    return out.sort_values(["o_year"])


@pytond()
def q09(part, supplier, lineitem, partsupp, orders, nation):
    p = part[part.p_name.str.contains("green")]
    j = p.merge(lineitem, left_on="p_partkey", right_on="l_partkey")
    j = j.merge(supplier, left_on="l_suppkey", right_on="s_suppkey")
    j = j.merge(partsupp, left_on=["l_suppkey", "l_partkey"],
                right_on=["ps_suppkey", "ps_partkey"])
    j = j.merge(orders, left_on="l_orderkey", right_on="o_orderkey")
    j = j.merge(nation, left_on="s_nationkey", right_on="n_nationkey")
    j["o_year"] = j.o_orderdate.dt.year
    j["amount"] = j.l_extendedprice * (1 - j.l_discount) - j.ps_supplycost * j.l_quantity
    r = j.groupby(["n_name", "o_year"], as_index=False).agg(
        sum_profit=("amount", "sum"))
    return r.sort_values(["n_name", "o_year"], ascending=[True, False])


@pytond()
def q10(customer, orders, lineitem, nation):
    o = orders[(orders.o_orderdate >= pd.Timestamp("1993-10-01")) &
               (orders.o_orderdate < pd.Timestamp("1994-01-01"))]
    li = lineitem[lineitem.l_returnflag == "R"]
    j = customer.merge(o, left_on="c_custkey", right_on="o_custkey")
    j = j.merge(li, left_on="o_orderkey", right_on="l_orderkey")
    j = j.merge(nation, left_on="c_nationkey", right_on="n_nationkey")
    j["revenue"] = j.l_extendedprice * (1 - j.l_discount)
    r = j.groupby(["c_custkey", "c_name", "c_acctbal", "c_phone", "n_name",
                   "c_address", "c_comment"], as_index=False).agg(
        revenue=("revenue", "sum"))
    return r.sort_values(["revenue"], ascending=False).head(20)


@pytond()
def q11(partsupp, supplier, nation):
    n = nation[nation.n_name == "GERMANY"]
    j = partsupp.merge(supplier, left_on="ps_suppkey", right_on="s_suppkey")
    j = j.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    j["value"] = j.ps_supplycost * j.ps_availqty
    total = j.value.sum()
    r = j.groupby(["ps_partkey"], as_index=False).agg(value=("value", "sum"))
    r = r[r.value > total * 0.0001]
    return r.sort_values(["value"], ascending=False)


@pytond()
def q12(orders, lineitem):
    li = lineitem[lineitem.l_shipmode.isin(["MAIL", "SHIP"])]
    li = li[(li.l_commitdate < li.l_receiptdate) &
            (li.l_shipdate < li.l_commitdate)]
    li = li[(li.l_receiptdate >= pd.Timestamp("1994-01-01")) &
            (li.l_receiptdate < pd.Timestamp("1995-01-01"))]
    j = orders.merge(li, left_on="o_orderkey", right_on="l_orderkey")
    j["high"] = np.where((j.o_orderpriority == "1-URGENT") |
                         (j.o_orderpriority == "2-HIGH"), 1, 0)
    j["low"] = np.where((j.o_orderpriority != "1-URGENT") &
                        (j.o_orderpriority != "2-HIGH"), 1, 0)
    r = j.groupby(["l_shipmode"], as_index=False).agg(
        high_line_count=("high", "sum"), low_line_count=("low", "sum"))
    return r.sort_values(["l_shipmode"])


@pytond()
def q13(customer, orders):
    o = orders[~orders.o_comment.str.contains("special.*requests", regex=True)]
    j = customer.merge(o, left_on="c_custkey", right_on="o_custkey", how="left")
    c = j.groupby(["c_custkey"], as_index=False).agg(c_count=("o_orderkey", "count"))
    r = c.groupby(["c_count"], as_index=False).agg(custdist=("c_custkey", "count"))
    return r.sort_values(["custdist", "c_count"], ascending=[False, False])


@pytond()
def q14(lineitem, part):
    li = lineitem[(lineitem.l_shipdate >= pd.Timestamp("1995-09-01")) &
                  (lineitem.l_shipdate < pd.Timestamp("1995-10-01"))]
    j = li.merge(part, left_on="l_partkey", right_on="p_partkey")
    j["revenue"] = j.l_extendedprice * (1 - j.l_discount)
    j["promo_revenue"] = np.where(j.p_type.str.startswith("PROMO"), j.revenue, 0.0)
    promo = j.promo_revenue.sum()
    total = j.revenue.sum()
    return 100.0 * promo / total


@pytond()
def q15(lineitem, supplier):
    li = lineitem[(lineitem.l_shipdate >= pd.Timestamp("1996-01-01")) &
                  (lineitem.l_shipdate < pd.Timestamp("1996-04-01"))].copy()
    li["rev"] = li.l_extendedprice * (1 - li.l_discount)
    revenue = li.groupby(["l_suppkey"], as_index=False).agg(
        total_revenue=("rev", "sum"))
    maxrev = revenue.total_revenue.max()
    r = revenue[revenue.total_revenue == maxrev]
    j = supplier.merge(r, left_on="s_suppkey", right_on="l_suppkey")
    out = j[["s_suppkey", "s_name", "s_address", "s_phone", "total_revenue"]]
    return out.sort_values(["s_suppkey"])


@pytond()
def q16(partsupp, part, supplier):
    p = part[(part.p_brand != "Brand#45") &
             (~part.p_type.str.startswith("MEDIUM POLISHED")) &
             (part.p_size.isin([49, 14, 23, 45, 19, 3, 36, 9]))]
    bad = supplier[supplier.s_comment.str.contains("Customer.*Complaints", regex=True)]
    ps = partsupp[~partsupp.ps_suppkey.isin(bad.s_suppkey)]
    j = ps.merge(p, left_on="ps_partkey", right_on="p_partkey")
    r = j.groupby(["p_brand", "p_type", "p_size"], as_index=False).agg(
        supplier_cnt=("ps_suppkey", "nunique"))
    return r.sort_values(["supplier_cnt", "p_brand", "p_type", "p_size"],
                         ascending=[False, True, True, True])


@pytond()
def q17(lineitem, part):
    p = part[(part.p_brand == "Brand#23") & (part.p_container == "MED BOX")]
    j = lineitem.merge(p, left_on="l_partkey", right_on="p_partkey")
    avg_qty = lineitem.groupby(["l_partkey"], as_index=False).agg(
        aq=("l_quantity", "mean"))
    j = j.merge(avg_qty, on="l_partkey")
    j = j[j.l_quantity < 0.2 * j.aq]
    total = j.l_extendedprice.sum()
    return total / 7.0


@pytond()
def q18(customer, orders, lineitem):
    g = lineitem.groupby(["l_orderkey"], as_index=False).agg(
        sq=("l_quantity", "sum"))
    big = g[g.sq > 300]
    o = orders[orders.o_orderkey.isin(big.l_orderkey)]
    j = customer.merge(o, left_on="c_custkey", right_on="o_custkey")
    j = j.merge(lineitem, left_on="o_orderkey", right_on="l_orderkey")
    r = j.groupby(["c_name", "c_custkey", "o_orderkey", "o_orderdate",
                   "o_totalprice"], as_index=False).agg(
        sum_qty=("l_quantity", "sum"))
    return r.sort_values(["o_totalprice", "o_orderdate"],
                         ascending=[False, True]).head(100)


@pytond()
def q19(lineitem, part):
    j = lineitem.merge(part, left_on="l_partkey", right_on="p_partkey")
    j = j[(j.l_shipmode.isin(["AIR", "REG AIR"])) &
          (j.l_shipinstruct == "DELIVER IN PERSON")]
    cond1 = ((j.p_brand == "Brand#12") &
             (j.p_container.isin(["SM CASE", "SM BOX", "SM PACK", "SM PKG"])) &
             (j.l_quantity >= 1) & (j.l_quantity <= 11) &
             (j.p_size >= 1) & (j.p_size <= 5))
    cond2 = ((j.p_brand == "Brand#23") &
             (j.p_container.isin(["MED BAG", "MED BOX", "MED PKG", "MED PACK"])) &
             (j.l_quantity >= 10) & (j.l_quantity <= 20) &
             (j.p_size >= 1) & (j.p_size <= 10))
    cond3 = ((j.p_brand == "Brand#34") &
             (j.p_container.isin(["LG CASE", "LG BOX", "LG PACK", "LG PKG"])) &
             (j.l_quantity >= 20) & (j.l_quantity <= 30) &
             (j.p_size >= 1) & (j.p_size <= 15))
    j = j[cond1 | cond2 | cond3]
    return (j.l_extendedprice * (1 - j.l_discount)).sum()


@pytond()
def q20(supplier, nation, partsupp, part, lineitem):
    p = part[part.p_name.str.startswith("forest")]
    li = lineitem[(lineitem.l_shipdate >= pd.Timestamp("1994-01-01")) &
                  (lineitem.l_shipdate < pd.Timestamp("1995-01-01"))]
    lg = li.groupby(["l_partkey", "l_suppkey"], as_index=False).agg(
        sq=("l_quantity", "sum"))
    ps = partsupp[partsupp.ps_partkey.isin(p.p_partkey)]
    j = ps.merge(lg, left_on=["ps_partkey", "ps_suppkey"],
                 right_on=["l_partkey", "l_suppkey"])
    j = j[j.ps_availqty > 0.5 * j.sq]
    n = nation[nation.n_name == "CANADA"]
    s = supplier.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    s = s[s.s_suppkey.isin(j.ps_suppkey)]
    out = s[["s_name", "s_address"]]
    return out.sort_values(["s_name"])


@pytond()
def q21(supplier, lineitem, orders, nation):
    n = nation[nation.n_name == "SAUDI ARABIA"]
    l1 = lineitem[lineitem.l_receiptdate > lineitem.l_commitdate]
    o = orders[orders.o_orderstatus == "F"]
    all_supp = lineitem.groupby(["l_orderkey"], as_index=False).agg(
        nsupp=("l_suppkey", "nunique"))
    late_supp = l1.groupby(["l_orderkey"], as_index=False).agg(
        nlate=("l_suppkey", "nunique"))
    multi = all_supp[all_supp.nsupp > 1]
    single_late = late_supp[late_supp.nlate == 1]
    j = l1.merge(o, left_on="l_orderkey", right_on="o_orderkey")
    j = j[j.l_orderkey.isin(multi.l_orderkey)]
    j = j[j.l_orderkey.isin(single_late.l_orderkey)]
    j = j.merge(supplier, left_on="l_suppkey", right_on="s_suppkey")
    j = j.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    r = j.groupby(["s_name"], as_index=False).agg(numwait=("l_orderkey", "count"))
    return r.sort_values(["numwait", "s_name"], ascending=[False, True]).head(100)


@pytond()
def q22(customer, orders):
    codes = ["13", "31", "23", "29", "30", "18", "17"]
    c = customer.copy()
    c["cntrycode"] = c.c_phone.str[:2]
    c = c[c.cntrycode.isin(codes)]
    pos = c[c.c_acctbal > 0.0]
    avg_bal = pos.c_acctbal.mean()
    c = c[c.c_acctbal > avg_bal]
    c = c[~c.c_custkey.isin(orders.o_custkey)]
    r = c.groupby(["cntrycode"], as_index=False).agg(
        numcust=("c_custkey", "count"), totacctbal=("c_acctbal", "sum"))
    return r.sort_values(["cntrycode"])


QUERIES = {f"q{i:02d}": fn for i, fn in enumerate(
    [q01, q02, q03, q04, q05, q06, q07, q08, q09, q10, q11, q12, q13, q14,
     q15, q16, q17, q18, q19, q20, q21, q22], start=1)}


def query_tables(fn) -> list[str]:
    """Base relations a query touches (its parameter names)."""
    import inspect

    return list(inspect.signature(fn).parameters)
