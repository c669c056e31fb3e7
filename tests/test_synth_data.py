"""Tests for the provided synth_data module and its graph extension."""
import pytest

from repro import synth_data


class TestTpchLite:
    """The provided OLAP generators still work (unused by the paper's
    experiments but part of the repo contract)."""

    def test_lineitem_shape(self, sparkf):
        df = synth_data.lineitem(sparkf, sf=0.001)
        assert df.count() == 6000
        assert "l_orderkey" in df.columns

    def test_orders_deterministic(self, sparkf):
        a = synth_data.orders(sparkf, sf=0.001).toPandas()
        b = synth_data.orders(sparkf, sf=0.001).toPandas()
        assert a.equals(b)

    def test_zipf_keys_skewed(self, sparkf):
        df = synth_data.zipf_keys(sparkf, n=5000, n_keys=100).toPandas()
        top = df["k"].value_counts().iloc[0]
        assert top > 5000 / 100  # far above uniform share


class TestGraphExtension:
    def test_reexports(self):
        assert set(synth_data.DATASETS) == {"YT", "VL", "SC", "GA", "AM", "AN"}
        assert len(synth_data.toy_edges()) == 20

    @pytest.mark.parametrize("key", ["YT", "SC"])
    def test_graph_edges_bridge(self, sparkf, key):
        df = synth_data.graph_edges(sparkf, key, scale=0.02)
        rows = df.collect()
        assert rows, "non-empty graph"
        assert all(r.src < r.dst for r in rows)
        assert df.columns == ["src", "dst", "eid"]
