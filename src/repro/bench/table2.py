"""Table 2 driver — the graph dataset suite.

The paper's Table 2 lists the five real evaluation graphs. We print the
same statistics (vertex count, edge count, avg degree, max degree) for
our synthetic *-lite stand-ins next to the paper's originals, so the
scale substitution is explicit. Statistics are computed with Spark
(degree aggregation) when a session is supplied, else with pandas.
"""
from __future__ import annotations

import pandas as pd

from ..synth_data import GRAPH_SPECS, graph_edges


def graph_stats(name: str, *, spark=None, seed: int = 7) -> dict:
    """V/E/avg-deg/max-deg of one lite graph (max over in+out degree,
    matching the paper's undirected-degree convention)."""
    pdf = graph_edges(name, seed=seed)
    if spark is not None:
        from pyspark.sql import functions as F

        sdf = spark.createDataFrame(pdf)
        deg = (
            sdf.select(F.col("src").alias("v"))
            .unionAll(sdf.select(F.col("dst").alias("v")))
            .groupBy("v")
            .agg(F.count("*").alias("deg"))
        )
        row = deg.agg(
            F.count("*").alias("nv"), F.max("deg").alias("mx")
        ).collect()[0]
        n_vertices, max_deg = int(row["nv"]), int(row["mx"])
    else:
        counts = pd.concat([pdf.src, pdf.dst]).value_counts()
        n_vertices, max_deg = len(counts), int(counts.max())
    spec = GRAPH_SPECS[name]
    return {
        "abbr": name,
        "dataset": spec.name,
        "vertices": n_vertices,
        "edges": len(pdf),
        "avg_deg": round(len(pdf) / n_vertices, 1),
        "max_deg": max_deg,
        "paper_vertices": spec.paper_v,
        "paper_edges": spec.paper_e,
        "paper_avg_deg": spec.paper_avg,
        "paper_max_deg": spec.paper_max,
    }


def run_table2(*, spark=None, seed: int = 7) -> dict:
    return {"rows": [graph_stats(n, spark=spark, seed=seed) for n in GRAPH_SPECS]}
