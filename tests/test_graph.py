"""Unit tests for the OpinionGraph substrate (repro.graphs.graph)."""
import numpy as np
import pytest

from repro.graphs.generators import random_instance, running_example
from repro.graphs.graph import OpinionGraph, _build_alias_row, spmv_dst


def _tiny(b0=None, d=None):
    src = [0, 1, 2]
    dst = [2, 2, 3]
    w = [2.0, 2.0, 5.0]
    b0 = b0 if b0 is not None else [[0.1, 0.2, 0.3, 0.4]]
    d = d if d is not None else [[0.0, 0.0, 0.5, 1.0]]
    return OpinionGraph.from_edges(4, np.array(src), np.array(dst), np.array(w), b0, d)


class TestConstruction:
    def test_column_stochastic_after_normalization(self):
        g = _tiny()
        g.validate()

    def test_in_degree_zero_nodes_get_self_loops(self):
        g = _tiny()
        loops = set(zip(g.src[g.src == g.dst].tolist(), g.dst[g.src == g.dst].tolist()))
        assert (0, 0) in loops and (1, 1) in loops

    def test_raw_weights_rescaled_per_destination(self):
        g = _tiny()
        mask = g.dst == 2
        assert np.allclose(np.sort(g.w[mask]), [0.5, 0.5])

    def test_zero_weight_edges_dropped(self):
        g = OpinionGraph.from_edges(
            3, np.array([0, 1]), np.array([2, 2]), np.array([1.0, 0.0]),
            [[0.0, 0.0, 0.0]], [[0.0, 0.0, 0.0]],
        )
        assert not ((g.src == 1) & (g.dst == 2)).any()

    def test_edges_sorted_by_dst(self):
        g = random_instance(50, seed=3)
        assert (np.diff(g.dst) >= 0).all()

    @pytest.mark.parametrize("bad_b0", [[[1.5, 0, 0, 0]], [[-0.1, 0, 0, 0]]])
    def test_rejects_out_of_range_opinions(self, bad_b0):
        with pytest.raises(ValueError):
            _tiny(b0=bad_b0)

    def test_rejects_negative_weights(self):
        with pytest.raises(ValueError):
            OpinionGraph.from_edges(
                2, np.array([0]), np.array([1]), np.array([-1.0]),
                [[0.0, 0.0]], [[0.0, 0.0]],
            )

    def test_rejects_out_of_range_node_ids(self):
        with pytest.raises(ValueError):
            OpinionGraph.from_edges(
                2, np.array([0]), np.array([5]), np.array([1.0]),
                [[0.0, 0.0]], [[0.0, 0.0]],
            )

    def test_rejects_shape_mismatch(self):
        with pytest.raises(ValueError):
            OpinionGraph.from_edges(
                2, np.array([0]), np.array([1]), np.array([1.0]),
                [[0.0, 0.0]], [[0.0, 0.0, 0.0]],
            )

    def test_candidate_names_default_and_custom(self):
        g = _tiny()
        assert g.candidates == ["c1"]
        e = running_example()
        assert e.candidates == ["c1", "c2"]

    @pytest.mark.parametrize("n,seed", [(20, 0), (57, 1), (123, 2), (200, 3)])
    def test_random_instances_validate(self, n, seed):
        random_instance(n, seed=seed).validate()


class TestSeeds:
    def test_with_seeds_sets_opinion_and_stubbornness(self):
        g = running_example()
        g2 = g.with_seeds(0, [2])
        assert g2.b0[0, 2] == 1.0 and g2.d[0, 2] == 1.0

    def test_with_seeds_does_not_touch_other_candidate(self):
        g = running_example()
        g2 = g.with_seeds(0, [2])
        assert np.array_equal(g2.b0[1], g.b0[1])
        assert np.array_equal(g2.d[1], g.d[1])

    def test_with_seeds_is_pure(self):
        g = running_example()
        b0_before = g.b0.copy()
        g.with_seeds(0, [0, 1, 2])
        assert np.array_equal(g.b0, b0_before)

    def test_empty_seed_set_is_identity(self):
        g = running_example()
        g2 = g.with_seeds(0, [])
        assert np.array_equal(g2.b0, g.b0) and np.array_equal(g2.d, g.d)


class TestSpmv:
    @pytest.mark.parametrize("seed", range(5))
    def test_matches_dense_matvec(self, seed):
        g = random_instance(40, seed=seed)
        rng = np.random.default_rng(seed)
        x = rng.random(g.n)
        W = np.zeros((g.n, g.n))
        W[g.src, g.dst] += g.w
        assert np.allclose(spmv_dst(g, x), x @ W)

    def test_matrix_batch_matches_per_row(self):
        g = random_instance(30, seed=9)
        rng = np.random.default_rng(0)
        X = rng.random((4, g.n))
        batched = spmv_dst(g, X)
        for i in range(4):
            assert np.allclose(batched[i], spmv_dst(g, X[i]))

    def test_stochasticity_preserves_ones(self):
        g = random_instance(25, seed=4)
        assert np.allclose(spmv_dst(g, np.ones(g.n)), 1.0)


class TestAlias:
    @pytest.mark.parametrize("probs", [[1.0], [0.5, 0.5], [0.9, 0.1], [0.2, 0.3, 0.5]])
    def test_alias_row_distribution(self, probs):
        p = np.array(probs)
        prob, alias = _build_alias_row(p)
        rng = np.random.default_rng(1)
        n = 200_000
        slot = (rng.random(n) * len(p)).astype(int)
        accept = rng.random(n) < prob[slot]
        draws = np.where(accept, slot, alias[slot])
        freq = np.bincount(draws, minlength=len(p)) / n
        assert np.allclose(freq, p, atol=0.01)

    def test_reverse_alias_sampling_matches_weights(self):
        g = running_example()
        at = g.reverse_alias()
        rng = np.random.default_rng(2)
        draws = at.sample(np.full(100_000, 2), rng)  # node 2 has in {0,1}
        freq = np.bincount(draws, minlength=4) / 100_000
        assert np.allclose(freq[[0, 1]], [0.5, 0.5], atol=0.01)

    def test_alias_cached(self):
        g = running_example()
        assert g.reverse_alias() is g.reverse_alias()


class TestAdjacencyAndExport:
    def test_out_adjacency_excludes_self_loops(self):
        g = running_example()
        indptr, indices = g.out_adjacency()
        assert indptr[-1] == 3  # only the 3 real edges

    def test_out_adjacency_neighbors(self):
        g = running_example()
        indptr, indices = g.out_adjacency()
        assert list(indices[indptr[0] : indptr[1]]) == [2]
        assert list(indices[indptr[2] : indptr[3]]) == [3]

    def test_edges_pdf_roundtrip(self):
        g = running_example()
        pdf = g.edges_pdf()
        assert len(pdf) == g.m and set(pdf.columns) == {"src", "dst", "w"}

    def test_state_pdf_has_all_candidates(self):
        g = running_example()
        pdf = g.state_pdf()
        assert len(pdf) == g.n * g.r
        assert set(pdf["cand"].unique()) == {0, 1}

    def test_state_pdf_single_candidate(self):
        g = running_example()
        pdf = g.state_pdf(cand=1)
        assert (pdf["cand"] == 1).all() and len(pdf) == g.n

    def test_to_spark_edges_schema(self, spark):
        g = running_example()
        df = g.to_spark_edges(spark)
        assert set(df.columns) == {"src", "dst", "w"}
        assert df.count() == g.m

    def test_to_spark_state_matches_pdf(self, spark):
        g = running_example()
        got = g.to_spark_state(spark).toPandas().sort_values(["cand", "node"])
        exp = g.state_pdf().sort_values(["cand", "node"])
        assert np.allclose(got["b"].to_numpy(), exp["b"].to_numpy())
