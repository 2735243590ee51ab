"""Synthetic data generators: determinism, schemas, referential shape."""
import numpy as np
import pytest

from repro import synth_data as sd


@pytest.fixture(scope="module")
def t():
    return sd.tpch_tables(sf=0.002)


class TestTpch:
    def test_all_tables_present(self, t):
        assert set(t) == {"region", "nation", "supplier", "customer", "part",
                          "partsupp", "orders", "lineitem"}

    def test_deterministic(self, t):
        t2 = sd.tpch_tables(sf=0.002)
        assert t["lineitem"].equals(t2["lineitem"])

    def test_fk_ranges(self, t):
        assert t["lineitem"]["l_orderkey"].max() <= t["orders"]["o_orderkey"].max()
        assert t["orders"]["o_custkey"].max() <= t["customer"]["c_custkey"].max()
        assert t["nation"]["n_regionkey"].isin(t["region"]["r_regionkey"]).all()

    def test_partsupp_pk_unique(self, t):
        ps = t["partsupp"]
        assert not ps.duplicated(["ps_partkey", "ps_suppkey"]).any()

    def test_receipt_after_ship(self, t):
        li = t["lineitem"]
        assert (li.l_receiptdate > li.l_shipdate).all()

    def test_predicate_selectivities_nonempty(self, t):
        li = t["lineitem"]
        q6 = li[(li.l_discount.between(0.05, 0.07)) & (li.l_quantity < 24)]
        assert 0 < len(q6) < len(li)
        assert t["part"]["p_name"].str.contains("green").any()
        assert t["part"]["p_name"].str.startswith("forest").any()
        assert (t["part"]["p_type"] == "ECONOMY ANODIZED STEEL").any()


class TestWorkloadData:
    def test_crime(self):
        d = sd.crime_data(n=1000)
        assert list(d.columns) == ["city_id", "total_population",
                                   "adult_population", "num_robberies"]
        assert (d.total_population > 500000).any()

    def test_births(self):
        d = sd.births_data(n=1000)
        assert set(d.sex.unique()) <= {"F", "M"}

    def test_flights(self):
        d = sd.flights_data(n=1000)
        assert d.cancelled.isin([0, 1]).all()

    def test_ecommerce(self):
        d = sd.ecommerce_data(n=1000)
        assert set(d) == {"sales", "products"}
        assert d["sales"].product_id.max() <= d["products"].product_id.max()

    def test_hybrid(self):
        d = sd.hybrid_tables(n_left=100, n_right=20)
        assert d["tleft"].lkey.max() <= d["tright"].rkey.max()
        assert not d["tright"].rkey.duplicated().any()


class TestMatrices:
    def test_dense_sparsity(self):
        m = sd.dense_matrix(1000, 4, sparsity_pct=10, seed=0)
        nz = (m != 0).mean()
        assert 0.05 < nz < 0.15

    def test_dense_table_roundtrip(self):
        m = sd.dense_matrix(10, 3, seed=1)
        t = sd.dense_matrix_table(m)
        assert list(t.columns) == ["id", "c0", "c1", "c2"]
        assert np.allclose(t[["c0", "c1", "c2"]].to_numpy(), m)

    def test_coo_roundtrip(self):
        m = sd.dense_matrix(10, 3, sparsity_pct=40, seed=2)
        t = sd.coo_matrix_table(m)
        back = np.zeros_like(m)
        back[t.row, t.col] = t.val
        assert np.allclose(back, m)
