"""Tests for the synthetic instance generators (repro.graphs.generators)."""
import numpy as np
import pytest

from repro.graphs.generators import (
    latent_topic_opinions,
    random_instance,
    running_example,
    social_graph,
)


class TestRunningExample:
    def test_structure(self):
        g = running_example()
        assert g.n == 4 and g.r == 2
        real = g.src != g.dst
        assert sorted(zip(g.src[real].tolist(), g.dst[real].tolist())) == [
            (0, 2), (1, 2), (2, 3),
        ]

    def test_stubbornness_is_half(self):
        g = running_example()
        assert np.allclose(g.d, 0.5)

    def test_initial_opinions(self):
        g = running_example()
        assert np.allclose(g.b0[0], [0.40, 0.80, 0.60, 0.90])
        assert np.allclose(g.b0[1], [0.35, 0.75, 1.00, 0.80])

    def test_validates(self):
        running_example().validate()


class TestSocialGraph:
    @pytest.mark.parametrize("n,deg", [(100, 2.0), (200, 5.0), (500, 1.5)])
    def test_edge_count_scales_with_degree(self, n, deg):
        src, dst, w = social_graph(n, deg, seed=0)
        # Dedup removes some; at least half the requested volume survives.
        assert len(src) >= 0.3 * n * deg
        assert len(src) == len(dst) == len(w)

    def test_no_self_loops(self):
        src, dst, _ = social_graph(300, 3.0, seed=1)
        assert (src != dst).all()

    def test_weights_in_unit_interval(self):
        _, _, w = social_graph(300, 3.0, seed=2)
        assert ((w > 0) & (w < 1)).all()

    def test_deterministic_in_seed(self):
        a = social_graph(100, 2.0, seed=7)
        b = social_graph(100, 2.0, seed=7)
        assert all(np.array_equal(x, y) for x, y in zip(a, b))

    def test_different_seeds_differ(self):
        a = social_graph(100, 2.0, seed=7)
        b = social_graph(100, 2.0, seed=8)
        assert not np.array_equal(a[0], b[0])

    def test_degree_skew_present(self):
        src, _, _ = social_graph(500, 4.0, seed=3)
        deg = np.bincount(src, minlength=500)
        # Power-law-ish: the max out-degree should far exceed the mean.
        assert deg.max() >= 5 * deg.mean()


class TestOpinions:
    @pytest.mark.parametrize("r", [2, 4, 10])
    def test_shape_and_range(self, r):
        b0 = latent_topic_opinions(200, r, seed=0)
        assert b0.shape == (r, 200)
        assert (b0 >= 0).all() and (b0 <= 1).all()

    def test_deterministic(self):
        assert np.array_equal(
            latent_topic_opinions(50, 3, seed=5), latent_topic_opinions(50, 3, seed=5)
        )

    def test_candidates_have_distinct_profiles(self):
        b0 = latent_topic_opinions(500, 2, seed=1)
        # Correlated-but-distinct: the two rows should not be identical.
        assert np.abs(b0[0] - b0[1]).max() > 0.1


class TestRandomInstance:
    @pytest.mark.parametrize("recipe", ["uniform", "variance"])
    def test_stubbornness_recipes(self, recipe):
        g = random_instance(80, seed=0, stubbornness=recipe)
        assert ((g.d >= 0) & (g.d <= 1)).all()
        g.validate()

    def test_variance_recipe_skews_stubborn(self):
        g = random_instance(400, seed=0, stubbornness="variance")
        assert g.d.mean() > 0.6  # 1 − Beta(1.2, 6) concentrates near 1

    def test_unknown_recipe_raises(self):
        with pytest.raises(ValueError):
            random_instance(10, seed=0, stubbornness="nope")

    @pytest.mark.parametrize("r", [2, 3, 10])
    def test_candidate_count(self, r):
        assert random_instance(40, r=r, seed=1).r == r

    def test_deterministic(self):
        a = random_instance(60, seed=9)
        b = random_instance(60, seed=9)
        assert np.array_equal(a.b0, b.b0) and np.array_equal(a.w, b.w)
