"""Empirical verification of Table II score properties (§III).

* all five scores: non-negative and non-decreasing w.r.t. the target's
  seed set (random instances × random nested seed sets);
* cumulative: submodular (Thm 3) — sampled (X ⊂ Y, s) triples;
* plurality & Copeland: NOT submodular — the paper's own counterexample
  (Example 3 on the running example) must violate submodularity;
* the submodularity-ratio-zero instance of §IV-D.

Plus hypothesis property tests for the normalization invariants.
"""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.graphs.generators import random_instance, running_example
from repro.graphs.graph import OpinionGraph
from repro.opinion.fj import opinions_at_horizon_np
from repro.voting.scores import score_np

SCORES = ["cumulative", "plurality", "p_approval", "positional_p_approval", "copeland"]
_KW = {"p": 2, "omega": np.array([1.0, 0.6, 0.2])}


def _f(g, t, S, score):
    b = opinions_at_horizon_np(g, t, 0, list(S))
    return score_np(b, 0, score, **_KW)


@pytest.mark.parametrize("score", SCORES)
@pytest.mark.parametrize("seed", range(3))
class TestMonotoneNonNegative:
    def test_non_negative(self, score, seed):
        g = random_instance(25, r=3, seed=seed, avg_deg=2.5)
        rng = np.random.default_rng(seed)
        S = rng.choice(25, size=4, replace=False).tolist()
        assert _f(g, 2, S, score) >= 0

    def test_non_decreasing(self, score, seed):
        g = random_instance(25, r=3, seed=seed + 10, avg_deg=2.5)
        rng = np.random.default_rng(seed)
        order = rng.permutation(25)[:6]
        vals = [_f(g, 2, order[:i], score) for i in range(7)]
        for a, b in zip(vals, vals[1:]):
            assert b >= a - 1e-9


class TestCumulativeSubmodular:
    @pytest.mark.parametrize("seed", range(5))
    def test_sampled_triples(self, seed):
        """Thm 3: f(X∪{s}) − f(X) ≥ f(Y∪{s}) − f(Y) for X ⊂ Y, s ∉ Y."""
        g = random_instance(20, r=2, seed=seed, avg_deg=2.5)
        rng = np.random.default_rng(seed)
        t = 3
        for _ in range(5):
            nodes = rng.permutation(20)
            X = nodes[:2].tolist()
            Y = nodes[:4].tolist()
            s = int(nodes[5])
            gx = _f(g, t, X + [s], "cumulative") - _f(g, t, X, "cumulative")
            gy = _f(g, t, Y + [s], "cumulative") - _f(g, t, Y, "cumulative")
            assert gx >= gy - 1e-9

    @pytest.mark.parametrize("seed", range(3))
    def test_per_user_opinion_submodular(self, seed):
        """Thm 3 is per-user; check each coordinate."""
        g = random_instance(15, r=2, seed=seed + 20, avg_deg=2.0)
        t = 2
        X, Y, s = [1], [1, 4], 7
        bx = opinions_at_horizon_np(g, t, 0, X)[0]
        bxs = opinions_at_horizon_np(g, t, 0, X + [s])[0]
        by = opinions_at_horizon_np(g, t, 0, Y)[0]
        bys = opinions_at_horizon_np(g, t, 0, Y + [s])[0]
        assert ((bxs - bx) >= (bys - by) - 1e-9).all()


class TestNonSubmodularity:
    def test_plurality_counterexample_example3(self):
        """Example 3: node 2 (paper user 2) has zero marginal gain on ∅ but
        positive marginal gain on {node 0} — submodularity violated."""
        g = running_example()
        f = lambda S: score_np(opinions_at_horizon_np(g, 1, 0, S), 0, "plurality")
        gain_on_empty = f([1]) - f([])
        gain_on_node0 = f([0, 1]) - f([0])
        assert gain_on_empty == 0 and gain_on_node0 == 1
        assert gain_on_empty < gain_on_node0  # violates submodularity

    def test_copeland_counterexample_example3(self):
        g = running_example()
        f = lambda S: score_np(opinions_at_horizon_np(g, 1, 0, S), 0, "copeland")
        assert f([1]) - f([]) == 0
        assert f([0, 1]) - f([0]) == 1

    def test_submodularity_ratio_zero_instance(self):
        """§IV-D: F(∅)=F({1})=F({2})=2 but F({1,2})=3 ⇒ ψ = 0."""
        g = running_example()
        f = lambda S: score_np(opinions_at_horizon_np(g, 1, 0, S), 0, "plurality")
        assert f([]) == 2 and f([0]) == 2 and f([1]) == 2 and f([0, 1]) == 3
        # LHS of Eq. 27 with S=∅, Ω={0,1} is 0 while RHS needs ψ·1.
        lhs = (f([0]) - f([])) + (f([1]) - f([]))
        rhs_gain = f([0, 1]) - f([])
        assert lhs == 0 and rhs_gain == 1


class TestNormalizationProperties:
    @settings(max_examples=30, deadline=None)
    @given(
        n=st.integers(3, 12),
        seed=st.integers(0, 10_000),
    )
    def test_from_edges_always_column_stochastic(self, n, seed):
        rng = np.random.default_rng(seed)
        m = rng.integers(1, n * 3)
        src = rng.integers(0, n, m)
        dst = rng.integers(0, n, m)
        w = rng.random(m) + 0.01
        b0 = rng.random((2, n))
        d = rng.random((2, n))
        g = OpinionGraph.from_edges(n, src, dst, w, b0, d)
        g.validate()

    @settings(max_examples=20, deadline=None)
    @given(n=st.integers(3, 10), seed=st.integers(0, 10_000), t=st.integers(0, 6))
    def test_opinions_always_in_unit_interval(self, n, seed, t):
        rng = np.random.default_rng(seed)
        m = rng.integers(1, n * 2)
        g = OpinionGraph.from_edges(
            n,
            rng.integers(0, n, m),
            rng.integers(0, n, m),
            rng.random(m) + 0.01,
            rng.random((2, n)),
            rng.random((2, n)),
        )
        b = opinions_at_horizon_np(g, t, 0, [0])
        assert (b >= -1e-9).all() and (b <= 1 + 1e-9).all()

    @settings(max_examples=20, deadline=None)
    @given(seed=st.integers(0, 10_000))
    def test_seed_nodes_always_pinned(self, seed):
        rng = np.random.default_rng(seed)
        g = random_instance(15, seed=int(seed) % 100, avg_deg=2.0)
        S = rng.choice(15, size=3, replace=False).tolist()
        b = opinions_at_horizon_np(g, int(rng.integers(0, 5)), 0, S)
        assert np.allclose(b[0, S], 1.0)
