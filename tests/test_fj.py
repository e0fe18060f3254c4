"""Tests for FJ/DeGroot diffusion — NumPy reference, Spark job, DuckDB oracle."""
import numpy as np
import pytest

from repro.graphs.generators import random_instance, running_example
from repro.opinion.fj import diffuse, fj_diffuse_np, fj_step, opinions_at_horizon_np
from repro.oracle import assert_equivalent

# One FJ step as SQL (DuckDB oracle side); identical aliases to fj_step.
_FJ_STEP_SQL = """
SELECT s.node AS node, s.cand AS cand,
       (1 - s.d) * agg.a + s.d * s.b0 AS b
FROM state s
JOIN (
    SELECT e.dst AS node, st.cand AS cand, SUM(e.w * st.b) AS a
    FROM edges e JOIN state st ON e.src = st.node
    GROUP BY e.dst, st.cand
) agg ON s.node = agg.node AND s.cand = agg.cand
"""


class TestNumpyReference:
    def test_t0_is_initial(self):
        g = running_example()
        assert np.array_equal(fj_diffuse_np(g, 0), g.b0)

    def test_example1_user3_recurrence(self):
        # b3^(1) = ½[b3^(0) + ½(b1^(0)+b2^(0))] per Example 1.
        g = running_example()
        b1 = fj_diffuse_np(g, 1)
        for q in range(2):
            expected = 0.5 * (g.b0[q, 2] + 0.5 * (g.b0[q, 0] + g.b0[q, 1]))
            assert np.isclose(b1[q, 2], expected)

    def test_example1_user4_recurrence(self):
        g = running_example()
        b1 = fj_diffuse_np(g, 1)
        b2 = fj_diffuse_np(g, 2)
        for q in range(2):
            # FJ: b4^(2) = ½·b3^(1) + ½·b4^(0) (stubbornness anchors to b0).
            assert np.isclose(b2[q, 3], 0.5 * b1[q, 2] + 0.5 * g.b0[q, 3])

    def test_no_in_neighbor_users_retain_initial(self):
        g = running_example()
        b = fj_diffuse_np(g, 7)
        assert np.allclose(b[:, [0, 1]], g.b0[:, [0, 1]])

    @pytest.mark.parametrize("t", [1, 3, 10])
    def test_opinions_stay_in_unit_interval(self, t):
        g = random_instance(60, r=3, seed=2)
        b = fj_diffuse_np(g, t)
        assert (b >= -1e-12).all() and (b <= 1 + 1e-12).all()

    def test_fully_stubborn_never_move(self):
        g = random_instance(40, seed=1)
        g.d[:] = 1.0
        assert np.allclose(fj_diffuse_np(g, 5), g.b0)

    def test_degroot_special_case_averages(self):
        # d == 0: a uniform opinion vector is a fixed point.
        g = random_instance(40, seed=3)
        g.d[:] = 0.0
        g.b0[:] = 0.7
        assert np.allclose(fj_diffuse_np(g, 6), 0.7)

    def test_single_candidate_slice_matches(self):
        g = random_instance(50, r=3, seed=4)
        full = fj_diffuse_np(g, 4)
        for q in range(3):
            assert np.allclose(fj_diffuse_np(g, 4, cand=q), full[q])

    def test_seed_pins_opinion_to_one(self):
        g = random_instance(50, seed=5)
        b = opinions_at_horizon_np(g, 6, 0, [7, 13])
        assert np.allclose(b[0, [7, 13]], 1.0)

    @pytest.mark.parametrize("t", [1, 2, 5])
    def test_monotone_in_seeds(self, t):
        g = random_instance(60, seed=6)
        base = opinions_at_horizon_np(g, t, 0, [])[0]
        seeded = opinions_at_horizon_np(g, t, 0, [0, 5, 9])[0]
        assert (seeded >= base - 1e-12).all()

    def test_b_init_override(self):
        g = random_instance(30, seed=7)
        ones = np.ones((g.r, g.n))
        b = fj_diffuse_np(g, 3, b_init=ones)
        # Aggregation of 1s is 1; stubbornness mixes back toward b0 ≤ 1.
        assert (b <= 1 + 1e-12).all() and (b >= g.b0.min() - 1e-12).all()


@pytest.mark.parametrize("n,r,t,seed", [(40, 2, 1, 0), (40, 2, 3, 1), (80, 3, 4, 2)])
def test_spark_diffuse_matches_numpy(spark, n, r, t, seed):
    g = random_instance(n, r=r, seed=seed)
    out = diffuse(g.to_spark_edges(spark), g.to_spark_state(spark), t)
    pdf = out.toPandas().sort_values(["cand", "node"])
    got = pdf["b"].to_numpy().reshape(r, n)
    assert np.allclose(got, fj_diffuse_np(g, t))


def test_spark_fj_step_oracle(spark):
    """One FJ step: Spark job ≡ DuckDB SQL over the same tables."""
    g = random_instance(50, r=2, seed=8)
    edges = g.to_spark_edges(spark)
    state = g.to_spark_state(spark)
    stepped = fj_step(edges, state).select("node", "cand", "b")
    assert_equivalent(
        stepped, _FJ_STEP_SQL, edges=g.edges_pdf(), state=g.state_pdf()
    )


def test_spark_diffuse_long_horizon_checkpointing(spark):
    """t crosses the localCheckpoint boundary; result still exact."""
    g = random_instance(30, seed=9)
    out = diffuse(g.to_spark_edges(spark), g.to_spark_state(spark), 7)
    pdf = out.toPandas().sort_values(["cand", "node"])
    assert np.allclose(pdf["b"].to_numpy(), fj_diffuse_np(g, 7).ravel())
