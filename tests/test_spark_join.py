"""Spark-executor integration tests: the Dynamic HHJ operator runs inside
``cogroup(...).applyInPandas`` and every result is checked against DuckDB.

The frame budgets are deliberately tiny so the executor-side operator
actually spills, recurses, and (in one case) bails out — "it ran" is not
the bar; byte-identical results with DuckDB are.
"""
import pytest

from repro import synth_data
from repro.core.join import HHJConfig
from repro.core.spark_join import dynamic_hhj_join
from repro.oracle import assert_equivalent

SF = 0.004


@pytest.fixture(scope="module")
def tpch(spark):
    return {
        "customer": synth_data.customer(spark, sf=SF),
        "orders": synth_data.orders(spark, sf=SF),
        "lineitem": synth_data.lineitem(spark, sf=SF),
        "part": synth_data.part(spark, sf=SF),
    }


def tight_cfg(**kw):
    base = dict(memory_frames=48, frame_bytes=4096, min_partitions=8)
    base.update(kw)
    return HHJConfig(**base)


class TestOracleJoins:
    def test_customer_orders(self, tpch):
        out = dynamic_hhj_join(tpch["customer"], tpch["orders"],
                               "c_custkey", "o_custkey", tight_cfg(),
                               num_spark_partitions=4)
        assert_equivalent(
            out.select("c_custkey", "o_orderkey", "o_totalprice"),
            "SELECT c_custkey, o_orderkey, o_totalprice FROM customer c "
            "JOIN orders o ON c.c_custkey = o.o_custkey",
            customer=tpch["customer"], orders=tpch["orders"])

    def test_orders_lineitem(self, tpch):
        out = dynamic_hhj_join(tpch["orders"], tpch["lineitem"],
                               "o_orderkey", "l_orderkey", tight_cfg(),
                               num_spark_partitions=4)
        assert_equivalent(
            out.select("o_orderkey", "l_partkey", "l_quantity"),
            "SELECT o_orderkey, l_partkey, l_quantity FROM orders o "
            "JOIN lineitem l ON o.o_orderkey = l.l_orderkey",
            orders=tpch["orders"], lineitem=tpch["lineitem"])

    def test_part_lineitem(self, tpch):
        out = dynamic_hhj_join(tpch["part"], tpch["lineitem"],
                               "p_partkey", "l_partkey", tight_cfg(),
                               num_spark_partitions=4)
        assert_equivalent(
            out.select("p_partkey", "p_size", "l_orderkey"),
            "SELECT p_partkey, p_size, l_orderkey FROM part p "
            "JOIN lineitem l ON p.p_partkey = l.l_partkey",
            part=tpch["part"], lineitem=tpch["lineitem"])

    @pytest.mark.parametrize("growth", ["ng-ns", "g-s"])
    def test_growth_policies_agree(self, tpch, growth):
        out = dynamic_hhj_join(tpch["customer"], tpch["orders"],
                               "c_custkey", "o_custkey",
                               tight_cfg(growth=growth),
                               num_spark_partitions=4)
        assert_equivalent(
            out.select("c_custkey", "o_orderkey"),
            "SELECT c_custkey, o_orderkey FROM customer c "
            "JOIN orders o ON c.c_custkey = o.o_custkey",
            customer=tpch["customer"], orders=tpch["orders"])

    @pytest.mark.parametrize("victim", ["largest-size", "smallest-records",
                                        "half-empty"])
    def test_victim_policies_agree(self, tpch, victim):
        out = dynamic_hhj_join(tpch["customer"], tpch["orders"],
                               "c_custkey", "o_custkey",
                               tight_cfg(victim=victim),
                               num_spark_partitions=4)
        assert_equivalent(
            out.select("c_custkey", "o_orderkey"),
            "SELECT c_custkey, o_orderkey FROM customer c "
            "JOIN orders o ON c.c_custkey = o.o_custkey",
            customer=tpch["customer"], orders=tpch["orders"])

    def test_aggregation_over_hhj_result(self, tpch):
        """Catalyst plans a real aggregation on top of the custom operator."""
        from pyspark.sql import functions as F
        out = dynamic_hhj_join(tpch["customer"], tpch["orders"],
                               "c_custkey", "o_custkey", tight_cfg(),
                               num_spark_partitions=4)
        agg = (out.groupBy("c_mktsegment")
                  .agg(F.count("*").alias("n"),
                       F.round(F.sum("o_totalprice"), 2).alias("total")))
        assert_equivalent(
            agg,
            "SELECT c_mktsegment, COUNT(*) AS n, "
            "ROUND(SUM(o_totalprice), 2) AS total FROM customer c "
            "JOIN orders o ON c.c_custkey = o.o_custkey GROUP BY c_mktsegment",
            customer=tpch["customer"], orders=tpch["orders"])


class TestWisconsinSpark:
    def test_wisconsin_join_with_size_column(self, spark):
        b = synth_data.wisconsin(spark, n=1500, dataset="all-small", seed=1)
        p = synth_data.wisconsin(spark, n=1500, dataset="all-small", seed=2)
        out = dynamic_hhj_join(b, p, "unique1", "unique1",
                               tight_cfg(memory_frames=32,
                                         frame_bytes=32 * 1024),
                               num_spark_partitions=4, size_column="rec_bytes")
        assert_equivalent(
            out.select("unique1", "unique2", "unique2_r"),
            "SELECT b.unique1 AS unique1, b.unique2 AS unique2, "
            "p.unique2 AS unique2_r FROM b JOIN p ON b.unique1 = p.unique1",
            b=b, p=p)

    def test_skewed_wisconsin_join(self, spark):
        b = synth_data.wisconsin(spark, n=1200, dataset="all-small", skew=True,
                                 seed=3)
        p = synth_data.wisconsin(spark, n=1200, dataset="all-small", seed=4)
        out = dynamic_hhj_join(b, p, "unique1", "unique1",
                               tight_cfg(memory_frames=24,
                                         frame_bytes=32 * 1024),
                               num_spark_partitions=4, size_column="rec_bytes")
        assert_equivalent(
            out.select("unique1", "unique2", "unique2_r"),
            "SELECT b.unique1 AS unique1, b.unique2 AS unique2, "
            "p.unique2 AS unique2_r FROM b JOIN p ON b.unique1 = p.unique1",
            b=b, p=p)


class TestSchemaHandling:
    def test_column_collisions_suffixed(self, spark):
        import pandas as pd
        a = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": ["a", "b"]}))
        b = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": ["x", "y"]}))
        out = dynamic_hhj_join(a, b, "k", "k",
                               HHJConfig(memory_frames=8, frame_bytes=4096,
                                         num_partitions=4, min_partitions=4),
                               num_spark_partitions=2)
        assert set(out.columns) == {"k", "v", "k_r", "v_r"}

    def test_null_keys_never_match(self, spark):
        import pandas as pd
        a = spark.createDataFrame(pd.DataFrame({"k": [1.0, None], "v": ["a", "n"]}))
        b = spark.createDataFrame(pd.DataFrame({"k": [1.0, None], "v": ["x", "m"]}))
        out = dynamic_hhj_join(a, b, "k", "k",
                               HHJConfig(memory_frames=8, frame_bytes=4096,
                                         num_partitions=4, min_partitions=4),
                               num_spark_partitions=2)
        rows = out.collect()
        assert len(rows) == 1
        assert rows[0]["v"] == "a" and rows[0]["v_r"] == "x"

    def test_empty_side_yields_empty(self, spark):
        import pandas as pd
        a = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": ["a", "b"]}))
        b = spark.createDataFrame([], schema="k long, w string")
        out = dynamic_hhj_join(a, b, "k", "k",
                               HHJConfig(memory_frames=8, frame_bytes=4096,
                                         num_partitions=4, min_partitions=4),
                               num_spark_partitions=2)
        assert out.count() == 0
