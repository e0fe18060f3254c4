"""Tests for reverse random walks (§V): unbiasedness (Thms 8–9),
truncation semantics, and the Spark generation/truncation pipeline."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graphs.generators import random_instance, running_example
from repro.opinion.fj import fj_diffuse_np
from repro.opinion.walks import (
    estimates,
    generate_walks,
    generate_walks_np,
    truncate_at,
    truncated_estimate_np,
    walk_kernel,
)


class TestKernel:
    def test_path_starts_at_start_node(self):
        g = running_example()
        rng = np.random.default_rng(0)
        paths = walk_kernel(np.array([2, 3]), 3, g.reverse_alias(), g.d[0], rng)
        assert paths[0][0] == 2 and paths[1][0] == 3

    @pytest.mark.parametrize("t", [0, 1, 4])
    def test_path_length_bounded(self, t):
        g = random_instance(50, seed=1)
        rng = np.random.default_rng(1)
        paths = walk_kernel(np.arange(50), t, g.reverse_alias(), g.d[0], rng)
        assert all(1 <= len(p) <= t + 1 for p in paths)

    def test_fully_stubborn_walks_stop_immediately(self):
        g = random_instance(30, seed=2)
        g.d[:] = 1.0
        rng = np.random.default_rng(2)
        paths = walk_kernel(np.arange(30), 5, g.reverse_alias(), g.d[0], rng)
        assert all(len(p) == 1 for p in paths)

    def test_non_stubborn_walks_run_full_length(self):
        g = random_instance(30, seed=3)
        g.d[:] = 0.0
        rng = np.random.default_rng(3)
        paths = walk_kernel(np.arange(30), 5, g.reverse_alias(), g.d[0], rng)
        assert all(len(p) == 6 for p in paths)

    def test_steps_follow_reverse_edges(self):
        g = running_example()
        rng = np.random.default_rng(4)
        in_nbrs = {0: {0}, 1: {1}, 2: {0, 1}, 3: {2}}
        paths = walk_kernel(np.full(200, 3), 2, g.reverse_alias(), g.d[0], rng)
        for p in paths:
            for a, b in zip(p, p[1:]):
                assert b in in_nbrs[a]


class TestUnbiasedness:
    @pytest.mark.parametrize("t", [1, 2, 4])
    def test_direct_generation_unbiased(self, t):
        """Thm 8: E[X] = b^(t).  20k walks/node → Hoeffding bound at 6σ."""
        g = running_example()
        exact = fj_diffuse_np(g, t)[0]
        starts = np.repeat(np.arange(4), 20_000)
        wdf = generate_walks_np(g, 0, starts, t, seed=11)
        est = wdf.groupby("start")["op"].mean().to_numpy()
        assert np.abs(est - exact).max() < 0.02

    def test_truncation_unbiased(self):
        """Thm 9: truncated estimate unbiased for b^(t)[S]."""
        g = running_example()
        S = {2}
        exact = fj_diffuse_np(g.with_seeds(0, list(S)), 2)[0]
        starts = np.repeat(np.arange(4), 20_000)
        wdf = generate_walks_np(g, 0, starts, 2, seed=12)
        wdf["op2"] = [
            truncated_estimate_np(p, o, S) for p, o in zip(wdf["path"], wdf["op"])
        ]
        est = wdf.groupby("start")["op2"].mean().to_numpy()
        assert np.abs(est - exact).max() < 0.02

    def test_truncation_on_random_graph(self):
        g = random_instance(25, seed=5, avg_deg=3.0)
        S = {3, 8}
        t = 3
        exact = fj_diffuse_np(g.with_seeds(0, list(S)), t)[0]
        starts = np.repeat(np.arange(g.n), 4000)
        wdf = generate_walks_np(g, 0, starts, t, seed=13)
        wdf["op2"] = [
            truncated_estimate_np(p, o, S) for p, o in zip(wdf["path"], wdf["op"])
        ]
        est = wdf.groupby("start")["op2"].mean().to_numpy()
        assert np.abs(est - exact).max() < 0.05


class TestTruncationSemantics:
    def test_no_seed_in_path_keeps_estimate(self):
        assert truncated_estimate_np([1, 2, 3], 0.4, {9}) == 0.4

    def test_seed_anywhere_gives_one(self):
        assert truncated_estimate_np([1, 2, 3], 0.4, {2}) == 1.0

    def test_start_node_as_seed(self):
        assert truncated_estimate_np([5, 1], 0.2, {5}) == 1.0


class TestSparkPipeline:
    def test_generate_walks_schema_and_count(self, spark):
        g = random_instance(40, seed=6)
        w = generate_walks(spark, g, 0, 3, lam=5, seed=1)
        assert w.count() == 40 * 5
        assert set(w.columns) == {"walk_id", "start", "path", "op"}

    def test_walks_per_start(self, spark):
        g = random_instance(30, seed=7)
        w = generate_walks(spark, g, 0, 2, lam=7, seed=2)
        counts = w.groupBy("start").count().toPandas()
        assert (counts["count"] == 7).all() and len(counts) == 30

    def test_starts_mode(self, spark):
        g = random_instance(30, seed=8)
        starts = np.array([0, 0, 5, 7])
        w = generate_walks(spark, g, 0, 2, starts=starts, seed=3).toPandas()
        assert sorted(w["start"].tolist()) == [0, 0, 5, 7]

    def test_requires_exactly_one_mode(self, spark):
        g = random_instance(10, seed=9)
        with pytest.raises(ValueError):
            generate_walks(spark, g, 0, 2, lam=3, starts=np.array([0]))
        with pytest.raises(ValueError):
            generate_walks(spark, g, 0, 2)

    def test_op_is_b0_of_path_end(self, spark):
        g = random_instance(30, seed=10)
        pdf = generate_walks(spark, g, 0, 3, lam=3, seed=4).toPandas()
        ends = pdf["path"].map(lambda p: p[-1]).to_numpy()
        assert np.allclose(pdf["op"].to_numpy(), g.b0[0, ends])

    def test_deterministic_in_seed(self, spark):
        g = random_instance(20, seed=11)
        a = generate_walks(spark, g, 0, 3, lam=3, seed=5).toPandas()
        b = generate_walks(spark, g, 0, 3, lam=3, seed=5).toPandas()
        a = a.sort_values("walk_id").reset_index(drop=True)
        b = b.sort_values("walk_id").reset_index(drop=True)
        assert (a["path"].map(tuple) == b["path"].map(tuple)).all()

    def test_truncate_at_matches_reference(self, spark):
        g = random_instance(30, seed=12)
        w = generate_walks(spark, g, 0, 4, lam=4, seed=6)
        got = truncate_at(w, 3).toPandas().sort_values("walk_id")
        ref = w.toPandas().sort_values("walk_id")
        exp_op = [
            truncated_estimate_np(p, o, {3})
            for p, o in zip(ref["path"], ref["op"])
        ]
        assert np.allclose(got["op"].to_numpy(), exp_op)
        for pg, pr in zip(got["path"], ref["path"]):
            if 3 in list(pr):
                assert list(pg) == list(pr)[: list(pr).index(3) + 1]
            else:
                assert list(pg) == list(pr)

    def test_estimates_aggregation(self, spark):
        g = random_instance(25, seed=13)
        w = generate_walks(spark, g, 0, 3, lam=6, seed=7)
        est = estimates(w).toPandas().sort_values("node")
        ref = (
            w.toPandas().groupby("start")["op"].mean().sort_index().to_numpy()
        )
        assert np.allclose(est["bhat"].to_numpy(), ref)
        assert (est["nwalks"] == 6).all()

    def test_spark_estimates_close_to_exact(self, spark):
        g = random_instance(20, seed=14, avg_deg=3.0)
        t = 3
        w = generate_walks(spark, g, 0, t, lam=400, seed=8)
        est = estimates(w).toPandas().sort_values("node")["bhat"].to_numpy()
        exact = fj_diffuse_np(g, t)[0]
        assert np.abs(est - exact).max() < 0.08
