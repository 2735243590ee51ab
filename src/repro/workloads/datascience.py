"""Hybrid data-science workloads of the paper's evaluation (Section V-A):
Crime Index, Birth Analysis, the Kaggle notebooks N3/N9, and the synthetic
hybrid matrix workloads (MatMul / Covar, plus the *Filtered* variants).

Each function is simultaneously the Python (Pandas/NumPy) baseline and the
PyTond compiler input. Input data comes from :mod:`repro.synth_data` (the
original notebook datasets are not available offline — see DESIGN.md).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.api import pytond
from repro.core.catalog import Catalog, TableSchema, schema_from_pandas


@pytond()
def crime_index(cities):
    """Weld's Crime Index: filter -> to_numpy -> einsum (mat-vec with a
    constant weight vector) -> back to a DataFrame -> filter/project."""
    big = cities[cities.total_population > 500000.0]
    data = big[["total_population", "adult_population", "num_robberies"]]
    a = data.to_numpy()
    w = np.array([2.0, 1.0, -2000.0])
    ci = np.einsum("ij,j->i", a, w)
    df = pd.DataFrame(ci, columns=["ci"])
    out = df[df.ci > 1000000.0]
    return out


@pytond(pivot_values={"sex": ["F", "M"]})
def birth_analysis(births):
    """Birth Analysis: mask-filter popular names, pivot births by sex over
    years, derive the F-share column."""
    avg = births.births.sum() / 400.0
    top = births.groupby(["name"], as_index=False).agg(total=("births", "sum"))
    top = top[top.total > avg]
    sel = births[births.name.isin(top.name)]
    pt = sel.pivot_table(index="year", columns="sex", values="births",
                         aggfunc="sum", fill_value=0).reset_index()
    pt["ratio"] = pt.F / (pt.F + pt.M)
    return pt.sort_values(["year"])


@pytond()
def kaggle_n3(flights):
    """N3 (airline delays): filters, per-origin baseline join, np.where
    flagging, grouped aggregation, post-aggregation filter, top-k."""
    f = flights[(flights.cancelled == 0) & (flights.dep_delay > -60.0)]
    by_origin = f.groupby(["origin"], as_index=False).agg(
        origin_delay=("dep_delay", "mean"))
    j = f.merge(by_origin, on="origin")
    j["rel_delay"] = j.dep_delay - j.origin_delay
    j["is_late"] = np.where(j.arr_delay > 15.0, 1.0, 0.0)
    g = j.groupby(["carrier", "month"], as_index=False).agg(
        avg_rel=("rel_delay", "mean"), late=("is_late", "sum"),
        n=("flight_id", "count"))
    g = g[g.n > 50]
    g["late_share"] = g.late / g.n
    return g.sort_values(["late_share"], ascending=False).head(20)


@pytond()
def kaggle_n9(sales, products):
    """N9 (e-commerce): join to the product dimension, revenue derivation,
    grouped aggregation with a distinct count."""
    s = sales[sales.returned == 0]
    j = s.merge(products, on="product_id")
    j["revenue"] = j.unit_price * j.quantity * (1 - j.discount)
    by_cat = j.groupby(["category", "month"], as_index=False).agg(
        revenue=("revenue", "sum"), orders=("order_id", "nunique"))
    by_cat["rev_per_order"] = by_cat.revenue / by_cat.orders
    return by_cat.sort_values(["category", "month"])


@pytond()
def hybrid_matmul(tleft, tright):
    """Join two tables, turn the numeric columns into a matrix, mat-vec."""
    j = tleft.merge(tright, left_on="lkey", right_on="rkey")
    a = j[["lval", "lf0", "lf1", "rf0", "rf1"]]
    m = a.to_numpy()
    w = np.array([0.5, 1.5, -2.0, 0.25, 1.0])
    v = np.einsum("ij,j->i", m, w)
    out = pd.DataFrame(v, columns=["score"])
    return out[out.score > 0.0]


@pytond()
def hybrid_matmul_filtered(tleft, tright):
    """Filtered variant: join-dependent filter before the einsum."""
    j = tleft.merge(tright, left_on="lkey", right_on="rkey")
    j = j[j.lval > j.rf0 * 5.0]
    a = j[["lval", "lf0", "lf1", "rf0", "rf1"]]
    m = a.to_numpy()
    w = np.array([0.5, 1.5, -2.0, 0.25, 1.0])
    v = np.einsum("ij,j->i", m, w)
    out = pd.DataFrame(v, columns=["score"])
    return out[out.score > 0.0]


@pytond()
def hybrid_covar(tleft, tright):
    """Join two tables, compute the covariance (Gram) matrix via einsum."""
    j = tleft.merge(tright, left_on="lkey", right_on="rkey")
    a = j[["lval", "lf0", "lf1", "rf0", "rf1"]]
    m = a.to_numpy()
    c = np.einsum("ij,ik->jk", m, m)
    return pd.DataFrame(c, columns=["k0", "k1", "k2", "k3", "k4"])


@pytond()
def hybrid_covar_filtered(tleft, tright):
    j = tleft.merge(tright, left_on="lkey", right_on="rkey")
    j = j[j.lval > j.rf0 * 5.0]
    a = j[["lval", "lf0", "lf1", "rf0", "rf1"]]
    m = a.to_numpy()
    c = np.einsum("ij,ik->jk", m, m)
    return pd.DataFrame(c, columns=["k0", "k1", "k2", "k3", "k4"])


# --------------------------------------------------------------------------
# Catalog / input builders
# --------------------------------------------------------------------------


def crime_catalog() -> Catalog:
    return Catalog().add(TableSchema(
        "cities", ("city_id", "total_population", "adult_population",
                   "num_robberies"), (frozenset({"city_id"}),)))


def births_catalog() -> Catalog:
    return Catalog().add(TableSchema("births", ("year", "name", "sex", "births")))


def flights_catalog() -> Catalog:
    return Catalog().add(TableSchema(
        "flights", ("flight_id", "carrier", "origin", "dest", "month",
                    "day_of_week", "dep_delay", "arr_delay", "distance",
                    "cancelled"), (frozenset({"flight_id"}),)))


def ecommerce_catalog() -> Catalog:
    cat = Catalog()
    cat.add(TableSchema("sales", ("order_id", "product_id", "quantity",
                                  "discount", "month", "returned")))
    cat.add(TableSchema("products", ("product_id", "category", "unit_price"),
                        (frozenset({"product_id"}),)))
    return cat


def hybrid_catalog() -> Catalog:
    cat = Catalog()
    cat.add(TableSchema("tleft", ("lkey", "lval", "lf0", "lf1")))
    cat.add(TableSchema("tright", ("rkey", "rf0", "rf1"),
                        (frozenset({"rkey"}),)))
    return cat


#: workload name -> (function, catalog builder, input builder)
def _inputs_crime(scale):
    from repro import synth_data
    return {"cities": synth_data.crime_data(n=int(100_000 * scale))}


def _inputs_births(scale):
    from repro import synth_data
    return {"births": synth_data.births_data(n=int(200_000 * scale))}


def _inputs_flights(scale):
    from repro import synth_data
    return {"flights": synth_data.flights_data(n=int(500_000 * scale))}


def _inputs_ecommerce(scale):
    from repro import synth_data
    return synth_data.ecommerce_data(n=int(300_000 * scale))


def _inputs_hybrid(scale):
    from repro import synth_data
    return synth_data.hybrid_tables(n_left=int(200_000 * scale),
                                    n_right=max(10, int(50_000 * scale)))


WORKLOADS = {
    "crime_index": (crime_index, crime_catalog, _inputs_crime),
    "birth_analysis": (birth_analysis, births_catalog, _inputs_births),
    "n3": (kaggle_n3, flights_catalog, _inputs_flights),
    "n9": (kaggle_n9, ecommerce_catalog, _inputs_ecommerce),
    "hybrid_matmul": (hybrid_matmul, hybrid_catalog, _inputs_hybrid),
    "hybrid_matmul_filtered": (hybrid_matmul_filtered, hybrid_catalog, _inputs_hybrid),
    "hybrid_covar": (hybrid_covar, hybrid_catalog, _inputs_hybrid),
    "hybrid_covar_filtered": (hybrid_covar_filtered, hybrid_catalog, _inputs_hybrid),
}
