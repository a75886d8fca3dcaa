"""Materialization barrier for iterative DataFrame algorithms.

``Dataset.localCheckpoint`` truncates *lineage* but propagates the
original plan's statistics (``originStats``) through the checkpoint, so
in a round-based algorithm the size-in-bytes BigInts compound
multiplicatively: the bit-count doubles every round and after a handful
of rounds Catalyst's join-selection grinds through million-bit BigInt
multiplications (observed: 80s of pure driver CPU per query by round 2).

A parquet round-trip is a true barrier: the re-read plan's leaf
statistics are the real file sizes, constant and small. This is also
what the paper's production setting does — each MapReduce round of
Flume materializes its output — so the barrier is faithful to the
system being reproduced, not just a workaround.
"""
from __future__ import annotations

import itertools
import os
import tempfile

from pyspark.sql import DataFrame, SparkSession

_counter = itertools.count()
_root: str | None = None


def _ckpt_root(spark: SparkSession) -> str:
    global _root
    if _root is None:
        base = os.environ.get("REPRO_CKPT_DIR", tempfile.gettempdir())
        _root = os.path.join(
            base, f"repro-ckpt-{spark.sparkContext.applicationId}"
        )
    return _root


def materialize(df: DataFrame, tag: str = "step") -> DataFrame:
    """Write ``df`` to parquet and read it back.

    Returns a DataFrame whose plan is a plain parquet scan: lineage cut,
    statistics reset to actual file sizes. Use at every round boundary of
    an iterative algorithm (TeraHAC, SCC, long CC runs).
    """
    spark = df.sparkSession
    path = os.path.join(_ckpt_root(spark), f"{tag}-{next(_counter)}")
    df.write.mode("overwrite").parquet(path)
    return spark.read.parquet(path)
