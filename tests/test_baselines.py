"""Tests for the baseline seeders (§VIII-A): IC/LT RR sets, PR, RWR, DC, GED-T."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.baselines.centrality import (
    degree_seeds,
    pagerank_np,
    pagerank_seeds,
    rwr_seeds,
)
from repro.baselines.ged_t import ged_t_seeds
from repro.baselines.im import (
    expected_influence_spread,
    generate_rr_sets,
    rr_sets_np,
    select_seeds_im,
)
from repro.core.dm import ExactEvaluator, greedy_dm
from repro.graphs.generators import random_instance, running_example
from repro.oracle import assert_equivalent


class TestRRSets:
    def test_ic_root_always_included(self):
        g = random_instance(30, seed=0)
        rng = np.random.default_rng(0)
        sets = rr_sets_np(g, "ic", np.arange(30), rng)
        for root, s in zip(range(30), sets):
            assert root in s

    def test_lt_is_a_path_of_distinct_nodes(self):
        g = random_instance(30, seed=1)
        rng = np.random.default_rng(1)
        sets = rr_sets_np(g, "lt", np.arange(30), rng)
        for s in sets:
            assert len(s) == len(set(s))

    def test_ic_respects_reverse_reachability(self):
        g = running_example()
        rng = np.random.default_rng(2)
        sets = rr_sets_np(g, "ic", np.full(50, 0), rng)
        for s in sets:  # node 0 has no real in-edges: RR set = {0}
            assert s == [0]

    def test_unknown_model_raises(self):
        g = random_instance(10, seed=2)
        with pytest.raises(ValueError):
            rr_sets_np(g, "xx", np.array([0]), np.random.default_rng(0))

    def test_spark_generation_counts(self, spark):
        g = random_instance(40, seed=3)
        rr = generate_rr_sets(spark, g, "ic", 200, seed=0)
        assert rr.count() == 200

    def test_spark_generation_deterministic(self, spark):
        g = random_instance(30, seed=4)
        a = generate_rr_sets(spark, g, "lt", 100, seed=5).toPandas()
        b = generate_rr_sets(spark, g, "lt", 100, seed=5).toPandas()
        a = a.sort_values("sketch_id").reset_index(drop=True)
        b = b.sort_values("sketch_id").reset_index(drop=True)
        assert (a["nodes"].map(tuple) == b["nodes"].map(tuple)).all()


class TestIMSeedSelection:
    @pytest.mark.parametrize("model", ["ic", "lt"])
    def test_selects_k_distinct(self, spark, model):
        g = random_instance(40, seed=5)
        seeds = select_seeds_im(spark, g, model, 3, theta=500, seed=1)
        assert len(seeds) == 3 and len(set(seeds)) == 3

    def test_first_seed_max_coverage(self, spark):
        g = random_instance(40, seed=6)
        theta = 400
        rr = generate_rr_sets(spark, g, "ic", theta, seed=2).toPandas()
        counts = {}
        for nodes in rr["nodes"]:
            for v in set(nodes):
                counts[v] = counts.get(v, 0) + 1
        best_cov = max(counts.values())
        seeds = select_seeds_im(spark, g, "ic", 1, theta=theta, seed=2)
        assert counts[seeds[0]] == best_cov

    def test_eis_bounds(self, spark):
        g = random_instance(40, seed=7)
        eis = expected_influence_spread(spark, g, "ic", [0, 1, 2], theta=500)
        assert 0 <= eis <= g.n

    def test_eis_monotone_in_seeds(self, spark):
        g = random_instance(40, seed=8)
        e1 = expected_influence_spread(spark, g, "lt", [0], theta=800, seed=3)
        e2 = expected_influence_spread(spark, g, "lt", [0, 5, 9], theta=800, seed=3)
        assert e2 >= e1


class TestCentrality:
    def test_degree_seeds_match_numpy(self, spark):
        g = random_instance(50, seed=9)
        seeds = degree_seeds(spark, g, 5)
        deg = np.zeros(g.n)
        real = g.src != g.dst
        np.add.at(deg, g.src[real], 1)
        # The top-5 returned must all have degree ≥ the 5th largest degree.
        kth = np.sort(deg)[-5]
        assert all(deg[s] >= kth for s in seeds)

    def test_degree_seeds_oracle(self, spark):
        g = random_instance(40, seed=10)
        edges = g.to_spark_edges(spark)
        got = (
            edges.where(F.col("src") != F.col("dst"))
            .groupBy(F.col("src").alias("v"))
            .agg(F.count("*").alias("deg"))
        )
        assert_equivalent(
            got,
            "SELECT src AS v, COUNT(*) AS deg FROM edges WHERE src <> dst GROUP BY src",
            edges=g.edges_pdf(),
        )

    def test_pagerank_np_is_distribution(self):
        g = random_instance(60, seed=11)
        pi = pagerank_np(g)
        assert pi.min() >= 0 and np.isclose(pi.sum(), 1.0, atol=1e-6)

    def test_pagerank_spark_matches_numpy(self, spark):
        g = random_instance(40, seed=12, avg_deg=3.0)
        from repro.baselines.centrality import _pagerank_df

        pi_df = _pagerank_df(
            spark, g, reverse=True, damping=0.85, iters=8, restart=None
        ).toPandas().sort_values("v")
        pi_np = pagerank_np(g, iters=8)
        assert np.allclose(pi_df["pi"].to_numpy(), pi_np, atol=1e-9)

    def test_pagerank_seeds_are_top(self, spark):
        g = random_instance(40, seed=13)
        seeds = pagerank_seeds(spark, g, 3, iters=8)
        pi = pagerank_np(g, iters=8)
        top = set(np.argsort(-pi)[:3].tolist())
        assert set(seeds) == top

    def test_rwr_restart_biases_ranking(self, spark):
        g = random_instance(40, seed=14)
        a = rwr_seeds(spark, g, 5, 0, iters=8)
        b = pagerank_seeds(spark, g, 5, iters=8)
        assert len(a) == 5  # may or may not differ from PR, but must be valid
        assert len(set(a)) == 5

    def test_degree_pads_when_graph_sparse(self, spark):
        # 3 nodes, single real edge → requesting 3 seeds pads deterministically.
        from repro.graphs.graph import OpinionGraph

        g = OpinionGraph.from_edges(
            3, np.array([0]), np.array([1]), np.array([1.0]),
            [[0.1, 0.2, 0.3]], [[0.5, 0.5, 0.5]],
        )
        seeds = degree_seeds(spark, g, 3)
        assert len(seeds) == 3 and len(set(seeds)) == 3


class TestGEDT:
    def test_matches_dm_cumulative_greedy(self):
        """Paper: GED-T ≡ DM for the cumulative score."""
        g = random_instance(30, seed=15)
        ev = ExactEvaluator(None, g, 0, 3, "cumulative")
        dm, _ = greedy_dm(ev, 3, celf=True)
        assert ged_t_seeds(None, g, 0, 3, 3) == dm
