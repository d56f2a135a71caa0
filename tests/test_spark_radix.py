"""Catalyst radix analytics, oracle-checked against DuckDB bit arithmetic."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.core import bits
from repro.oracle import assert_equivalent
from repro.spark import (
    apply_update_stream,
    classify_groups,
    degree_table,
    group_weights,
    inter_group_probs,
    max_bits,
    radix_decompose,
)
from repro.graphs.updates import make_update_plan


@pytest.fixture(scope="module")
def edges_pdf():
    return synth_data.graph_edges("GO").head(4000)


@pytest.fixture(scope="module")
def edges(spark, edges_pdf):
    return spark.createDataFrame(edges_pdf)


def _k_of(pdf):
    return max(1, int(pdf.bias.max()).bit_length())


class TestMaxBits:
    def test_matches_local(self, edges, edges_pdf):
        assert max_bits(edges) == _k_of(edges_pdf)


class TestRadixDecompose:
    def test_oracle(self, edges, edges_pdf):
        K = _k_of(edges_pdf)
        got = radix_decompose(edges).select("src", "dst", "k", "sub_bias")
        assert_equivalent(
            got,
            f"""
            SELECT e.src AS src, e.dst AS dst, t.k AS k,
                   CAST(1 << t.k AS BIGINT) AS sub_bias
            FROM edges e, (SELECT UNNEST(range(0, {K})) AS k) t
            WHERE (e.bias >> t.k) & 1 = 1
            """,
            edges=edges_pdf,
        )

    def test_subbias_sums_reconstruct_bias(self, spark, edges):
        from pyspark.sql import functions as F

        recon = (
            radix_decompose(edges)
            .groupBy("src", "dst", "bias")
            .agg(F.sum("sub_bias").alias("s"))
            .where(F.col("s") != F.col("bias"))
        )
        assert recon.count() == 0

    def test_paper_example(self, spark):
        pdf = pd.DataFrame({"src": [2, 2, 2], "dst": [1, 4, 5], "bias": [5, 4, 3]})
        rows = (
            radix_decompose(spark.createDataFrame(pdf))
            .orderBy("dst", "k")
            .collect()
        )
        got = [(r["dst"], r["k"], r["sub_bias"]) for r in rows]
        assert got == [(1, 0, 1), (1, 2, 4), (4, 2, 4), (5, 0, 1), (5, 1, 2)]


class TestGroupWeights:
    def test_oracle(self, edges, edges_pdf):
        K = _k_of(edges_pdf)
        got = group_weights(edges)
        assert_equivalent(
            got,
            f"""
            SELECT e.src AS src, t.k AS k,
                   SUM(CAST(1 << t.k AS BIGINT)) AS w,
                   COUNT(*) AS cnt
            FROM edges e, (SELECT UNNEST(range(0, {K})) AS k) t
            WHERE (e.bias >> t.k) & 1 = 1
            GROUP BY e.src, t.k
            """,
            edges=edges_pdf,
        )

    def test_matches_core_bits(self, spark, edges_pdf):
        # Spark's Eq. 4 equals core.bits.group_weights per vertex.
        sample = edges_pdf[edges_pdf.src == edges_pdf.src.iloc[0]]
        sdf = spark.createDataFrame(sample)
        got = {
            (r["k"]): r["w"]
            for r in group_weights(sdf).collect()
        }
        W = bits.group_weights(sample.bias.to_numpy())
        for k, w in enumerate(W):
            if w:
                assert got[k] == w

    def test_weight_totals_equal_bias_totals(self, spark, edges, edges_pdf):
        from pyspark.sql import functions as F

        tot = group_weights(edges).agg(F.sum("w")).collect()[0][0]
        assert tot == edges_pdf.bias.sum()


class TestInterGroupProbs:
    def test_probs_sum_to_one(self, spark, edges):
        from pyspark.sql import functions as F

        sums = (
            inter_group_probs(edges)
            .groupBy("src")
            .agg(F.sum("p").alias("s"))
            .where(F.abs(F.col("s") - 1.0) > 1e-9)
        )
        assert sums.count() == 0

    def test_oracle(self, edges, edges_pdf):
        K = _k_of(edges_pdf)
        assert_equivalent(
            inter_group_probs(edges),
            f"""
            WITH gw AS (
              SELECT e.src AS src, t.k AS k,
                     SUM(CAST(1 << t.k AS BIGINT)) AS w
              FROM edges e, (SELECT UNNEST(range(0, {K})) AS k) t
              WHERE (e.bias >> t.k) & 1 = 1
              GROUP BY e.src, t.k
            )
            SELECT src, k, w / SUM(w) OVER (PARTITION BY src) AS p FROM gw
            """,
            edges=edges_pdf,
        )


class TestClassifyGroups:
    def test_oracle(self, edges, edges_pdf):
        K = _k_of(edges_pdf)
        assert_equivalent(
            classify_groups(edges),
            f"""
            WITH gw AS (
              SELECT e.src AS src, t.k AS k, COUNT(*) AS cnt
              FROM edges e, (SELECT UNNEST(range(0, {K})) AS k) t
              WHERE (e.bias >> t.k) & 1 = 1
              GROUP BY e.src, t.k
            ), deg AS (
              SELECT src, COUNT(*) AS d FROM edges GROUP BY src
            )
            SELECT gw.src AS src, gw.k AS k, gw.cnt AS cnt, deg.d AS d,
                   CASE WHEN gw.cnt * 100.0 / deg.d > 40 THEN 'dense'
                        WHEN gw.cnt = 1 THEN 'one_element'
                        WHEN gw.cnt * 100.0 / deg.d < 10 THEN 'sparse'
                        ELSE 'regular' END AS kind
            FROM gw JOIN deg ON gw.src = deg.src
            """,
            edges=edges_pdf,
        )

    def test_matches_bingo_store_census(self, spark, edges_pdf):
        # The relational Eq. 9 census equals the in-store group kinds.
        from collections import Counter

        from repro.core import BingoStore

        sub = edges_pdf.head(800)
        got = Counter(
            r["kind"]
            for r in classify_groups(spark.createDataFrame(sub)).collect()
        )
        st = BingoStore(sub)
        hist = st.group_kind_histogram()
        assert got == Counter(dict(hist))


class TestDegreeAndUpdates:
    def test_degree_oracle(self, edges, edges_pdf):
        assert_equivalent(
            degree_table(edges),
            "SELECT src AS src, COUNT(*) AS deg FROM edges GROUP BY src",
            edges=edges_pdf,
        )

    def test_update_stream_oracle(self, spark, edges_pdf):
        plan = make_update_plan(edges_pdf, batch_size=50, n_batches=4,
                                mode="mixed", seed=21)
        updates = pd.concat(plan.batches, ignore_index=True)
        got = apply_update_stream(
            spark.createDataFrame(plan.initial),
            spark.createDataFrame(updates),
        )
        assert_equivalent(
            got,
            """
            SELECT src, dst, bias FROM (
              SELECT src, dst, bias FROM initial
              UNION ALL
              SELECT src, dst, bias FROM updates WHERE op = 1
            ) u
            WHERE NOT EXISTS (
              SELECT 1 FROM updates d
              WHERE d.op = -1 AND d.src = u.src AND d.dst = u.dst
            )
            """,
            initial=plan.initial,
            updates=updates,
        )
