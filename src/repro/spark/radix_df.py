"""Catalyst-native radix decomposition and group analytics (paper §4.1).

The relational half of BINGO — exploding each edge's bias into its
power-of-two sub-biases (Eq. 3), aggregating per-(vertex, radix) group
weights W(p_k) (Eq. 4), and classifying groups into the adaptive
representations of Eq. 9 — is expressed purely in the DataFrame API so
Catalyst plans it (sequence+explode, bitwise shifts, groupBy). Every
function here is oracle-checked against the same SQL in DuckDB.

Input contract: an edge DataFrame with integer columns
``src, dst, bias`` (bias >= 1).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, functions as F


def max_bits(edges: DataFrame) -> int:
    """K — number of radix groups needed for the graph's largest bias."""
    m = edges.agg(F.max("bias").alias("m")).collect()[0]["m"]
    return max(1, int(m).bit_length())


def radix_decompose(edges: DataFrame, K: int | None = None) -> DataFrame:
    """Eq. 3 as a Catalyst plan: one row per (edge, set bit position).

    Output columns: src, dst, bias, k, sub_bias (= 2^k).
    """
    if K is None:
        K = max_bits(edges)
    return (
        edges.select(
            "src",
            "dst",
            "bias",
            F.explode(F.sequence(F.lit(0), F.lit(K - 1))).alias("k"),
        )
        .where(F.expr("shiftright(bias, k) & 1 = 1"))
        .withColumn("sub_bias", F.expr("CAST(shiftleft(1, k) AS BIGINT)"))
    )


def group_weights(edges: DataFrame, K: int | None = None) -> DataFrame:
    """Eq. 4 per vertex: W(p_k) = Σ_i (w_i & 2^k) over out-edges of src.

    Output columns: src, k, w (group weight), cnt (group cardinality).
    """
    return (
        radix_decompose(edges, K)
        .groupBy("src", "k")
        .agg(F.sum("sub_bias").alias("w"), F.count("*").alias("cnt"))
    )


def inter_group_probs(edges: DataFrame, K: int | None = None) -> DataFrame:
    """Eq. 5 per vertex: the inter-group transition probability of each
    radix group. Output: src, k, p."""
    w = group_weights(edges, K)
    tot = w.groupBy("src").agg(F.sum("w").alias("tot"))
    return w.join(tot, "src").select(
        "src", "k", (F.col("w") / F.col("tot")).alias("p")
    )


def classify_groups(
    edges: DataFrame,
    K: int | None = None,
    *,
    alpha: float = 40.0,
    beta: float = 10.0,
) -> DataFrame:
    """Eq. 9 over the whole graph: the adaptive representation each
    (vertex, radix) group takes, in the paper's listed priority order.

    Output columns: src, k, cnt, d (vertex out-degree), kind.
    """
    sizes = group_weights(edges, K)
    degrees = edges.groupBy("src").agg(F.count("*").alias("d"))
    ratio = F.col("cnt") * 100.0 / F.col("d")
    kind = (
        F.when(ratio > alpha, F.lit("dense"))
        .when(F.col("cnt") == 1, F.lit("one_element"))
        .when(ratio < beta, F.lit("sparse"))
        .otherwise(F.lit("regular"))
    )
    return sizes.join(degrees, "src").select(
        "src", "k", "cnt", "d", kind.alias("kind")
    )


def degree_table(edges: DataFrame) -> DataFrame:
    """Table 2 statistics source: per-vertex out-degree."""
    return edges.groupBy("src").agg(F.count("*").alias("deg"))


def apply_update_stream(edges: DataFrame, updates: DataFrame) -> DataFrame:
    """Apply an insert/delete update stream relationally.

    ``updates`` carries op (+1 insert / -1 delete), src, dst, bias. The
    net-final edge set is (edges ∪ inserts) minus deletes — valid for the
    §6.1-generated streams, where an edge is never both inserted and
    deleted in one stream. Oracle-checked against DuckDB set algebra.
    """
    inserts = updates.where(F.col("op") == 1).select("src", "dst", "bias")
    deletes = updates.where(F.col("op") == -1).select("src", "dst")
    return (
        edges.select("src", "dst", "bias")
        .unionByName(inserts)
        .join(deletes, ["src", "dst"], "left_anti")
    )
