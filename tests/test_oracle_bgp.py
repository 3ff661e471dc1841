"""Catalyst BGP matcher ⟷ DuckDB oracle.

Every query-result check goes through ``repro.oracle.assert_equivalent``:
the Spark DataFrame produced by the Catalyst matcher is diffed row-for-row
against the same BGP expressed as SQL on DuckDB over the identical triples
table.  This is what certifies the ground truth that all engines are then
compared against.
"""
import pytest

from repro.bench.harness import build_workload
from repro.graph.bruteforce import embeddings, first_match_index
from repro.oracle import assert_equivalent
from repro.spark_ops.batch_match import bgp_to_sql, first_match_spark, spark_bgp_match
from repro.streams.datasets import stream_to_pandas, stream_to_spark
from repro.streams.querygen import generate_queries


@pytest.fixture(scope="module")
def snb(spark):
    updates, queries = build_workload("snb", n_updates=220, n_queries=16, avg_len=4, seed=4)
    return updates, queries, stream_to_spark(spark, updates)


@pytest.mark.parametrize("qi", range(16))
def test_catalyst_matches_duckdb(snb, qi):
    """Per generated query: Catalyst self-join plan == DuckDB SQL."""
    updates, queries, triples_df = snb
    q = queries[qi]
    got = spark_bgp_match(triples_df, q)
    assert_equivalent(got, bgp_to_sql(q, table="g"), g=stream_to_pandas(updates))


@pytest.mark.parametrize("qi", [0, 3, 7, 11])
def test_catalyst_matches_bruteforce(snb, qi):
    updates, queries, triples_df = snb
    q = queries[qi]
    rows = spark_bgp_match(triples_df, q).collect()
    var_vids = sorted(q.var_vids())
    got = sorted(tuple(r[f"v{v}"] for v in var_vids) for r in rows)
    exp = sorted({tuple(e[v] for v in var_vids) for e in embeddings(q, updates)})
    assert got == exp


def test_first_match_spark_equals_bruteforce(snb):
    updates, queries, triples_df = snb
    got = first_match_spark(triples_df, queries[:8])
    exp = {}
    for q in queries[:8]:
        fm = first_match_index(q, updates)
        if fm is not None:
            exp[q.qid] = fm
    assert got == exp


class TestHandwrittenPatterns:
    """Directed shapes checked against DuckDB on a tiny explicit graph."""

    @pytest.fixture(scope="class")
    def tiny(self, spark):
        import pandas as pd

        rows = [
            (0, "a", "knows", "b"),
            (1, "b", "knows", "c"),
            (2, "c", "knows", "a"),
            (3, "a", "likes", "p1"),
            (4, "b", "likes", "p1"),
            (5, "a", "knows", "c"),
        ]
        pdf = pd.DataFrame(rows, columns=["t", "s", "p", "o"])
        return pdf, spark.createDataFrame(pdf)

    def q(self, vertices, edges):
        from repro.graph.model import QueryPattern

        return QueryPattern(qid=0, vertices=vertices, edges=edges)

    @pytest.mark.parametrize(
        "vertices,edges",
        [
            ([None, None], [(0, "knows", 1)]),  # single edge
            ([None, None, None], [(0, "knows", 1), (1, "knows", 2)]),  # chain
            ([None, None], [(0, "knows", 1), (1, "knows", 0)]),  # 2-cycle
            ([None, None, None], [(0, "knows", 1), (1, "knows", 2), (2, "knows", 0)]),
            ([None, None, "p1"], [(0, "knows", 1), (0, "likes", 2), (1, "likes", 2)]),
            (["a", None], [(0, "knows", 1)]),  # literal source
            ([None, "p1"], [(0, "likes", 1)]),  # literal target
            (["a", "b"], [(0, "knows", 1)]),  # no variables at all
        ],
    )
    def test_pattern(self, tiny, vertices, edges):
        pdf, df = tiny
        q = self.q(vertices, edges)
        assert_equivalent(spark_bgp_match(df, q), bgp_to_sql(q), g=pdf)


class TestProvidedTpchOracle:
    """Smoke tests that the provided DuckDB bridge itself behaves, using the
    stock TPC-H-lite generators."""

    def test_lineitem_aggregate(self, spark):
        from pyspark.sql import functions as F

        from repro.synth_data import lineitem

        li = lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(
            F.count("*").alias("cnt"), F.round(F.sum("l_quantity"), 2).alias("qty")
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS cnt, round(sum(l_quantity), 2) AS qty "
            "FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_orders_join(self, spark):
        from pyspark.sql import functions as F

        from repro.synth_data import lineitem, orders

        li, o = lineitem(spark, sf=0.001), orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderstatus")
            .agg(F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderstatus, count(*) AS cnt FROM li JOIN o "
            "ON l_orderkey = o_orderkey GROUP BY o_orderstatus",
            li=li,
            o=o,
        )
