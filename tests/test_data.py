"""Synthetic dataset generators: shapes, determinism, integrity, formulas."""
import numpy as np
import pytest

from repro.data.favorita import N_DATES, N_ITEMS, N_STORES, favorita
from repro.data.imdb import imdb
from repro.data.star import DimSpec, build_star
from repro.data.tpcds import tpcds


class TestStarBuilder:
    def test_fact_shape_and_payload(self, spark):
        d = build_star(
            spark, "f", 500, [DimSpec("d1", "k1", 10, "x1")],
            lambda f: f["x1"].astype("float64"), n_fact_payload=2, seed=0,
        )
        assert len(d.fact) == 500
        assert {"payload_0", "payload_1"} <= set(d.fact.columns)

    def test_deterministic(self, spark):
        kw = dict(fact_rows=200, dims=[DimSpec("d1", "k1", 10, "x1")],
                  target=lambda f: f["x1"].astype("float64"), seed=9)
        a = build_star(spark, "f", **kw)
        b = build_star(spark, "f", **kw)
        assert a.fact.equals(b.fact)
        assert a.dims["d1"].equals(b.dims["d1"])

    def test_fk_integrity(self, spark):
        d = build_star(
            spark, "f", 300, [DimSpec("d1", "k1", 7, "x1")],
            lambda f: f["x1"].astype("float64"), seed=1,
        )
        assert d.fact["k1"].between(1, 7).all()
        assert d.wide_pandas().shape[0] == 300  # every FK resolves

    def test_shared_key_dims(self, spark):
        """Dims sharing a key (oil/holiday on date) see the same FK draw."""
        dims = [DimSpec("a", "k", 10, "xa"), DimSpec("b", "k", 10, "xb")]
        d = build_star(spark, "f", 300, dims,
                       lambda f: (f["xa"] + f["xb"]).astype("float64"), seed=2)
        wide = d.wide_pandas()
        assert len(wide) == 300  # single shared key column, no blow-up

    def test_target_formula_plus_noise(self, spark):
        d = build_star(
            spark, "f", 400, [DimSpec("d1", "k1", 5, "x1")],
            lambda f: 2.0 * f["x1"], noise_sigma=0.0, seed=3,
        )
        wide = d.wide_pandas()
        np.testing.assert_allclose(wide["y"], 2.0 * wide["x1"])


class TestFavorita:
    def test_schema_shape(self, favorita_tiny):
        g = favorita_tiny.graph
        assert set(g.relations) == {
            "sales", "stores", "items", "transactions", "oil", "holiday"
        }
        assert len(g.edges) == 5
        assert g.y_relation == "sales"

    def test_dim_sizes(self, favorita_tiny):
        assert len(favorita_tiny.dims["stores"]) == N_STORES
        assert len(favorita_tiny.dims["items"]) == N_ITEMS
        assert len(favorita_tiny.dims["oil"]) == N_DATES

    def test_thirteen_features_default(self, spark):
        d = favorita(spark, sf=0.0005, n_extra_features=8)
        assert len(d.graph.all_features()) == 13

    def test_target_formula(self, spark):
        d = favorita(spark, sf=0.0005, n_extra_features=0, noise_sigma=0.0, seed=4)
        w = d.wide_pandas()
        expect = (
            w["f_item"] * np.log(w["f_item"])
            + np.log(w["f_oil"])
            - 10.0 * w["f_date"]
            - 10.0 * w["f_store"]
            + w["f_trans"].astype("float64") ** 2 / 1000.0
        )
        np.testing.assert_allclose(w["y"], expect, rtol=1e-12)

    def test_scale_factor(self, spark):
        small = favorita(spark, sf=0.0005)
        assert len(small.fact) == 1500

    def test_feature_domain(self, favorita_tiny):
        for name, pdf in favorita_tiny.dims.items():
            feats = [c for c in pdf.columns if c.startswith("f_")]
            for f in feats:
                assert pdf[f].between(1, 1000).all()


class TestTpcds:
    def test_feature_count(self, spark):
        d = tpcds(spark, sf=0.0005, n_features=12)
        assert len(d.graph.all_features()) == 12

    def test_minimum_features(self, spark):
        with pytest.raises(ValueError):
            tpcds(spark, sf=0.0005, n_features=3)

    def test_snowflake(self, spark):
        d = tpcds(spark, sf=0.0005, n_features=5)
        assert d.graph.is_snowflake()


class TestImdb:
    def test_join_rows_exact(self, imdb_tiny):
        wide = imdb_tiny.wide_pandas()
        assert len(wide) == imdb_tiny.join_rows

    def test_blowup_scales_with_fanout(self, spark):
        a = imdb(spark, n_movies=40, mean_cast=2.0, mean_companies=2.0, seed=1)
        b = imdb(spark, n_movies=40, mean_cast=8.0, mean_companies=8.0, seed=1)
        assert b.join_rows > 4 * a.join_rows

    def test_galaxy_structure(self, imdb_tiny):
        g = imdb_tiny.graph
        assert not g.is_snowflake()
        assert g.y_relation == "movie"
        g.validate_tree()  # 5 relations, 4 edges, connected

    def test_fk_integrity(self, imdb_tiny):
        t = imdb_tiny.tables
        assert t["cast_info"]["person_id"].isin(t["person"]["person_id"]).all()
        assert t["cast_info"]["movie_id"].isin(t["movie"]["movie_id"]).all()
        assert t["movie_company"]["company_id"].isin(t["company"]["company_id"]).all()

    def test_every_movie_castable(self, imdb_tiny):
        """cast_sizes, comp_sizes ≥ 1 ⇒ every movie appears in R⋈."""
        wide = imdb_tiny.wide_pandas()
        assert wide["movie_id"].nunique() == len(imdb_tiny.tables["movie"])
