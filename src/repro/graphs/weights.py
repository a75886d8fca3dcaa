"""Edge-weighting scheme for unweighted graphs (paper, §6).

The paper's large real-world graphs are unweighted; it assigns
``w(u,v) = 1 / log(deg(u) + deg(v))`` (natural log), which favours merging
low-degree vertices. We apply the same scheme to our rMAT stand-ins.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graphs.edges import degrees


def degree_log_weights(edges: DataFrame) -> DataFrame:
    """Attach ``raw = 1/ln(deg(u)+deg(v))`` to an unweighted canonical edge
    table ``(u, v)``. Output: ``(u, v, raw)`` ready for TeraHAC (singleton
    clusters, so raw == w)."""
    deg = degrees(edges.select("u", "v", F.lit(1.0).alias("raw")))
    du = deg.select(F.col("id").alias("u"), F.col("deg").alias("du"))
    dv = deg.select(F.col("id").alias("v"), F.col("deg").alias("dv"))
    return (
        edges.join(du, "u")
        .join(dv, "v")
        .select("u", "v", (F.lit(1.0) / F.log(F.col("du") + F.col("dv"))).alias("raw"))
    )
