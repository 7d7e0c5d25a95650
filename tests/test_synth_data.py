"""Smoke tests for the provided TPC-H-lite generators and the graph
extensions added for this paper, plus a DuckDB-oracle sanity check that
the oracle machinery itself works end to end."""
from repro import synth_data
from repro.oracle import assert_equivalent


class TestTpchLite:
    def test_lineitem_shape(self, spark):
        df = synth_data.lineitem(spark, sf=0.001)
        assert df.count() == 6000
        assert "l_orderkey" in df.columns

    def test_orders_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001).toPandas()
        b = synth_data.orders(spark, sf=0.001).toPandas()
        assert a.equals(b)

    def test_oracle_roundtrip_aggregation(self, spark):
        """assert_equivalent catches nothing here (sanity): a Spark
        aggregation equals the same SQL on DuckDB."""
        li = synth_data.lineitem(spark, sf=0.001)
        from pyspark.sql import functions as F

        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("cnt"),
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, SUM(l_quantity) AS sum_qty,
                   COUNT(*) AS cnt
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )


class TestGraphExtensions:
    def test_random_labeled_graph_schema(self, spark):
        df = synth_data.random_labeled_graph(
            spark, n_nodes=20, n_edges=50, labels=("x", "y"), seed=1
        )
        assert df.columns == ["src", "label", "dst"]
        labels = {r.label for r in df.select("label").distinct().collect()}
        assert labels <= {"x", "y"}

    def test_random_labeled_graph_deterministic(self, spark):
        a = synth_data.random_labeled_graph(spark, n_nodes=9, n_edges=30).toPandas()
        b = synth_data.random_labeled_graph(spark, n_nodes=9, n_edges=30).toPandas()
        assert a.equals(b)

    def test_ontology_edges(self, spark):
        df = synth_data.ontology_edges(spark, "skos")
        # query graph: forward + inverse edges
        assert df.count() == 2 * 252
