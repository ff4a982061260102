"""Parquet-backed segment store — the LMDB substitute (paper §5).

The paper stores 8–10 s video segments as MB-sized values in LMDB keyed by
(stream, segment, storage format) and retrieves/deletes each independently.
Here each stored version is a parquet row carrying the format knobs, the
simulated on-disk size, and the ingest CPU spent — so storage/ingestion
accounting are Spark SQL aggregations, cross-checked against DuckDB with the
repo oracle. Ingestion itself is the per-partition ``mapInPandas`` transcode
job from :mod:`repro.codec.transcode`.
"""
from __future__ import annotations

import os
import shutil

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.codec.transcode import transcode_segments
from repro.formats import StorageFormat
from repro.video.datasets import Dataset
from repro.video.frames import segments_df


class SegmentStore:
    """Segment-granularity KV store over the local filesystem."""

    def __init__(self, root: str) -> None:
        self.root = root
        os.makedirs(root, exist_ok=True)

    def _path(self, dataset: str) -> str:
        return os.path.join(self.root, f"stream={dataset}")

    # -- ingestion ------------------------------------------------------------

    def ingest(
        self,
        spark: SparkSession,
        ds: Dataset,
        sfs: dict[str, StorageFormat],
        *,
        hours: float = 1.0,
    ) -> DataFrame:
        """Transcode ``hours`` of one stream into every storage format and
        persist the stored versions. Returns the stored DataFrame."""
        segs = segments_df(spark, ds, hours=hours)
        stored = transcode_segments(segs, sfs)
        stored.write.mode("overwrite").parquet(self._path(ds.name))
        return self.load(spark, ds.name)

    # -- access ---------------------------------------------------------------

    def load(self, spark: SparkSession, dataset: str) -> DataFrame:
        return spark.read.parquet(self._path(dataset))

    def storage_by_sf(self, spark: SparkSession, dataset: str) -> DataFrame:
        """Total stored KB per storage format (oracle-checkable)."""
        return (
            self.load(spark, dataset)
            .groupBy("sf_id")
            .agg(
                F.sum("size_kb").alias("total_kb"),
                F.count("*").alias("segments"),
                F.sum("ingest_core_s").alias("ingest_core_s"),
            )
        )

    def storage_kb_per_s(self, spark: SparkSession, dataset: str) -> float:
        """Storage growth rate: stored KB per ingested video-second."""
        df = self.load(spark, dataset)
        kb = df.agg(F.sum("size_kb")).collect()[0][0]
        secs = (
            df.select("segment_id", "seconds")
            .distinct()
            .agg(F.sum("seconds"))
            .collect()[0][0]
        )
        return float(kb) / float(secs)

    # -- erosion --------------------------------------------------------------

    def apply_erosion(
        self,
        spark: SparkSession,
        dataset: str,
        deleted_fracs: dict[str, float],
    ) -> DataFrame:
        """Delete the given fraction of each SF's segments (lowest segment ids
        first, deterministically) and rewrite the stream. Returns the new DF."""
        df = self.load(spark, dataset)
        n_seg = df.select("segment_id").distinct().count()
        conds = None
        for sf_id, frac in deleted_fracs.items():
            cutoff = int(round(frac * n_seg))
            c = (F.col("sf_id") == sf_id) & (F.col("segment_id") < cutoff)
            conds = c if conds is None else (conds | c)
        kept = df if conds is None else df.filter(~conds)
        tmp = self._path(dataset) + ".tmp"
        kept.write.mode("overwrite").parquet(tmp)
        final = self._path(dataset)
        shutil.rmtree(final, ignore_errors=True)
        os.replace(tmp, final)
        return self.load(spark, dataset)
