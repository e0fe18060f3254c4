"""Tests for the provided synth_data generators and the graph extension."""
import numpy as np

from repro import synth_data


class TestProvidedGenerators:
    def test_lineitem_shape(self, spark):
        df = synth_data.lineitem(spark, sf=0.001)
        assert df.count() == 6000
        assert "l_orderkey" in df.columns

    def test_orders_keys_sequential(self, spark):
        pdf = synth_data.orders(spark, sf=0.001).toPandas()
        assert pdf["o_orderkey"].tolist() == list(range(1, len(pdf) + 1))

    def test_zipf_keys_skewed(self, spark):
        pdf = synth_data.zipf_keys(spark, n=20000, n_keys=100).toPandas()
        counts = pdf["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

    def test_uniform_keys_range(self, spark):
        pdf = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
        assert pdf["k"].between(1, 50).all()


class TestSocialNetworkExtension:
    def test_returns_consistent_triple(self, spark):
        edges, state, g = synth_data.social_network(spark, n=50, r=2, seed=1)
        assert edges.count() == g.m
        assert state.count() == g.n * g.r
        g.validate()

    def test_deterministic(self, spark):
        _, _, a = synth_data.social_network(spark, n=40, seed=2)
        _, _, b = synth_data.social_network(spark, n=40, seed=2)
        assert np.array_equal(a.b0, b.b0)
