"""Graph statistics via Spark SQL (Table 3's columns).

Degree statistics are computed with DataFrame aggregations (and checked
against DuckDB in the tests); ``k_max``/``l_max`` are graph-level core
statistics obtained from the distributed Phase-I H-index fixpoints.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def clean_edges(edges: DataFrame) -> DataFrame:
    """Normalise to a simple digraph: (src, dst) longs, no self-loops or
    duplicate edges."""
    return (
        edges.select(
            F.col(edges.columns[0]).cast("long").alias("src"),
            F.col(edges.columns[1]).cast("long").alias("dst"),
        )
        .where("src <> dst")
        .dropDuplicates(["src", "dst"])
    )


def degree_table(edges: DataFrame) -> DataFrame:
    """Per-vertex (vid, in_deg, out_deg); vertices with zero on one side
    included."""
    e = clean_edges(edges)
    ind = e.groupBy(F.col("dst").alias("vid")).agg(F.count("*").alias("in_deg"))
    outd = e.groupBy(F.col("src").alias("vid")).agg(F.count("*").alias("out_deg"))
    return (
        ind.join(outd, "vid", "full")
        .select(
            "vid",
            F.coalesce("in_deg", F.lit(0)).alias("in_deg"),
            F.coalesce("out_deg", F.lit(0)).alias("out_deg"),
        )
    )


def graph_summary(edges: DataFrame) -> dict:
    """|V|, |E|, deg_avg (= |E|/|V|, matching Table 3's convention of
    counting each edge once), and the three max degrees."""
    deg = degree_table(edges)
    row = deg.agg(
        F.count("*").alias("n_vertices"),
        F.sum("in_deg").alias("n_edges"),
        F.max("in_deg").alias("max_in_deg"),
        F.max("out_deg").alias("max_out_deg"),
        F.max(F.col("in_deg") + F.col("out_deg")).alias("max_deg"),
    ).collect()[0]
    d = row.asDict()
    d["n_edges"] = int(d["n_edges"])
    d["deg_avg"] = d["n_edges"] / d["n_vertices"]
    return d


def core_limits(spark: SparkSession, edges: DataFrame, mode: str = "block") -> dict:
    """Graph-level ``k_max``/``l_max`` (Table 3's last two columns): the
    maxima of the per-vertex Phase-I in-/out-H-index fixpoints."""
    from repro.core.anchored import HIndexProgram
    from repro.framework.local_engine import LocalEngine

    pdf = clean_edges(edges).toPandas()
    eng = LocalEngine(list(zip(pdf["src"].tolist(), pdf["dst"].tolist())))
    kmax, _ = eng.run(HIndexProgram("in"), mode=mode)
    lmax, _ = eng.run(HIndexProgram("out"), mode=mode)
    return {
        "kmax": max(kmax.values(), default=0),
        "lmax": max(lmax.values(), default=0),
    }
