"""Provided TPC-H-lite generators + the graph_stream extension."""
import pytest

from repro import synth_data


class TestTpchLite:
    def test_lineitem_shape(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        assert li.count() == 6000
        assert "l_orderkey" in li.columns

    def test_orders_keys_sequential(self, spark):
        o = synth_data.orders(spark, sf=0.001)
        row = o.agg({"o_orderkey": "max"}).collect()[0]
        assert row[0] == 1500

    def test_determinism(self, spark):
        a = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
        b = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
        assert a.equals(b)

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 3 * counts.median()


class TestGraphStreamExtension:
    @pytest.mark.parametrize("dataset", ["snb", "nyc", "biogrid"])
    def test_schema_and_size(self, spark, dataset):
        df = synth_data.graph_stream(spark, dataset=dataset, n_updates=80, seed=0)
        assert df.columns == ["t", "s", "p", "o"]
        assert df.count() == 80

    def test_matches_streams_module(self, spark):
        from repro.streams.datasets import snb_stream, stream_to_pandas

        df = synth_data.graph_stream(spark, dataset="snb", n_updates=60, seed=3)
        expected = stream_to_pandas(snb_stream(60, seed=3))
        got = df.toPandas().sort_values("t").reset_index(drop=True)
        assert got.equals(expected)
