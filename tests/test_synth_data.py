"""Tests for synth_data: the provided TPC-H-lite generators still work
(exercised through the DuckDB oracle, as mandated) and the graph-schema
extension produces engine-consumable tables."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestTpchLite:
    def test_lineitem_deterministic(self, sparks):
        a = synth_data.lineitem(sparks, sf=0.001, seed=0).toPandas()
        b = synth_data.lineitem(sparks, sf=0.001, seed=0).toPandas()
        assert a.equals(b)

    def test_orders_oracle_roundtrip(self, sparks):
        """Exercise the provided oracle on a plain aggregate."""
        o = synth_data.orders(sparks, sf=0.001)
        got = o.groupBy("o_orderstatus").agg(
            F.count("*").alias("n"), F.round(F.sum("o_totalprice"), 2).alias("total")
        )
        assert_equivalent(
            got,
            "SELECT o_orderstatus, count(*) AS n, "
            "round(sum(o_totalprice), 2) AS total FROM orders "
            "GROUP BY o_orderstatus",
            orders=o,
        )

    def test_join_lineitem_orders_oracle(self, sparks):
        li = synth_data.lineitem(sparks, sf=0.001)
        o = synth_data.orders(sparks, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS n FROM lineitem l "
            "JOIN orders o ON l.l_orderkey = o.o_orderkey "
            "GROUP BY o_orderpriority",
            lineitem=li,
            orders=o,
        )

    def test_zipf_skew(self, sparks):
        df = synth_data.zipf_keys(sparks, n=5000, n_keys=100).toPandas()
        top = df.k.value_counts().iloc[0]
        assert top > 5000 / 100 * 3  # rank-1 key much hotter than uniform


class TestGraphExtension:
    def test_powerlaw_edges_table(self, sparks):
        e = synth_data.powerlaw_edges(sparks, n=100, m=300, seed=1)
        assert e.columns == ["src", "dst"]
        assert e.where(F.col("src") == F.col("dst")).count() == 0
        # symmetric
        n = e.count()
        rev = e.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
        assert e.intersect(rev).count() == n

    def test_labeled_powerlaw_graph(self, sparks):
        e, l = synth_data.labeled_powerlaw_graph(
            sparks, n=100, m=300, n_labels=5, seed=2
        )
        assert l.columns == ["v", "label"]
        vs = {r.src for r in e.select("src").distinct().collect()}
        lv = {r.v for r in l.select("v").distinct().collect()}
        assert vs == lv

    def test_matches_engine_input_contract(self, sparks):
        from repro.core.mining import count_cliques

        e = synth_data.powerlaw_edges(sparks, n=100, m=300, seed=3)
        assert count_cliques(e, 3) >= 0
