"""Random forest + sampling over non-materialized joins (paper §5.5.2)."""
import numpy as np
import pytest

from repro.core.rf import RandomForest, ancestral_sample
from repro.core.trainer import TrainParams

P = TrainParams(max_leaves=4)


@pytest.fixture(scope="module")
def rf_fit(favorita_tiny):
    rf = RandomForest(
        favorita_tiny.graph, n_trees=4, row_fraction=0.5, feature_fraction=0.8,
        params=P, seed=3,
    )
    return rf.fit()


class TestRandomForest:
    def test_tree_count(self, rf_fit):
        assert len(rf_fit.ensemble.trees) == 4
        assert len(rf_fit.tree_seconds) == 4

    def test_predictions_beat_mean(self, rf_fit, favorita_tiny):
        wide = favorita_tiny.wide_pandas()
        rmse = rf_fit.ensemble.rmse_np(wide, "y")
        assert rmse < float(wide["y"].std())

    def test_deterministic_in_seed(self, favorita_tiny):
        a = RandomForest(favorita_tiny.graph, n_trees=2, row_fraction=0.5,
                         params=P, seed=9).fit()
        b = RandomForest(favorita_tiny.graph, n_trees=2, row_fraction=0.5,
                         params=P, seed=9).fit()
        for t1, t2 in zip(a.ensemble.trees, b.ensemble.trees):
            assert t1.to_dict() == t2.to_dict()

    def test_parallel_same_models(self, favorita_tiny):
        ser = RandomForest(favorita_tiny.graph, n_trees=3, row_fraction=0.5,
                           params=P, seed=5, n_jobs=1).fit()
        par = RandomForest(favorita_tiny.graph, n_trees=3, row_fraction=0.5,
                           params=P, seed=5, n_jobs=3).fit()
        for t1, t2 in zip(ser.ensemble.trees, par.ensemble.trees):
            assert t1.to_dict() == t2.to_dict()

    def test_feature_fraction(self, favorita_tiny):
        rf = RandomForest(favorita_tiny.graph, n_trees=1, row_fraction=0.5,
                          feature_fraction=0.4, params=P, seed=1)
        res = rf.fit()
        n_feats = len(favorita_tiny.graph.all_features())
        used = set(res.ensemble.trees[0].referenced_features())
        assert len(used) <= max(1, int(round(n_feats * 0.4)))

    def test_galaxy_rejected(self, imdb_tiny):
        with pytest.raises(ValueError, match="snowflake"):
            RandomForest(imdb_tiny.graph)

    def test_average_prediction_semantics(self, rf_fit, favorita_tiny):
        wide = favorita_tiny.wide_pandas()
        per_tree = np.stack([t.predict_np(wide) for t in rf_fit.ensemble.trees])
        np.testing.assert_allclose(
            rf_fit.ensemble.predict_np(wide), per_tree.mean(axis=0)
        )


class TestAncestralSampling:
    def test_snowflake_uniformity(self, star_int):
        """Sampled root keys follow the R⋈ marginal (≡ fact frequency)."""
        samp = ancestral_sample(star_int.graph, n=3000, root="fact", seed=0)
        assert len(samp) == 3000
        # fact rows are the R⋈ rows (snowflake): ka frequencies match
        wide_freq = star_int.fact["ka"].value_counts(normalize=True)
        samp_freq = samp["ka"].value_counts(normalize=True)
        joined = wide_freq.to_frame("w").join(samp_freq.to_frame("s")).fillna(0)
        assert (joined["w"] - joined["s"]).abs().max() < 0.03

    def test_sample_contains_all_columns(self, star_int):
        samp = ancestral_sample(star_int.graph, n=50, root="fact", seed=1)
        for col in ("ka", "kb", "kc", "fa", "fb", "fc", "y"):
            assert col in samp.columns

    def test_samples_are_joinable(self, star_int):
        """Every sampled row is a genuine R⋈ row (no cross-products)."""
        samp = ancestral_sample(star_int.graph, n=40, root="fact", seed=2)
        wide = star_int.wide_pandas()
        cols = ["ka", "kb", "kc", "fa", "fb", "fc"]
        wide_keys = set(map(tuple, wide[cols].itertuples(index=False)))
        for row in samp[cols].itertuples(index=False):
            assert tuple(row) in wide_keys

    def test_galaxy_sampling_weights(self, imdb_tiny):
        """Movies are sampled ∝ their cast × company fan-out in R⋈."""
        samp = ancestral_sample(imdb_tiny.graph, n=2500, root="movie", seed=3)
        wide = imdb_tiny.wide_pandas()
        wide_freq = wide["movie_id"].value_counts(normalize=True)
        samp_freq = samp["movie_id"].value_counts(normalize=True)
        joined = wide_freq.to_frame("w").join(samp_freq.to_frame("s")).fillna(0)
        assert (joined["w"] - joined["s"]).abs().max() < 0.05
