"""Chunked dataset upload (paper §3.2, S5).

"The data.csv might be very large. For scalably uploading large
datasets, we divide the file into 10,000 lines and send each divided
set to our system." We reproduce that contract: the client-side reader
yields 10,000-line chunks; each chunk is 'POSTed' (a function call) to
the ingestor, which accumulates normalized chunks and finally registers
the dataset in the :class:`~repro.store.datasets.DatasetStore` as the
two internal relations. Timestamps are validated against the
synchronized grid and converted to the tick index; literal ``null``
measurements become NaN.
"""
from __future__ import annotations

from pathlib import Path
from typing import Iterator

import pandas as pd
from pyspark.sql import SparkSession

from repro.smartcity.schema import (
    DATA_CSV_HEADER,
    LOCATION_CSV_HEADER,
    LOCATIONS_SCHEMA,
    READINGS_SCHEMA,
    timestamps_to_ticks,
)
from repro.store.datasets import DatasetStore

CHUNK_LINES = 10_000


def read_location_csv(path: str | Path) -> pd.DataFrame:
    pdf = pd.read_csv(path, dtype={"id": str})
    missing = set(LOCATION_CSV_HEADER) - set(pdf.columns)
    if missing:
        raise ValueError(f"location.csv missing columns: {sorted(missing)}")
    return pdf.rename(columns={"id": "sensor_id"})[
        ["sensor_id", "attribute", "lat", "lon"]
    ]


def read_attribute_csv(path: str | Path) -> list[str]:
    return [ln.strip() for ln in Path(path).read_text().splitlines() if ln.strip()]


def iter_data_chunks(path: str | Path, chunk_lines: int = CHUNK_LINES) -> Iterator[pd.DataFrame]:
    """Yield data.csv in ``chunk_lines``-row chunks (paper: 10,000)."""
    for chunk in pd.read_csv(
        path, dtype={"id": str}, na_values=["null"], keep_default_na=True,
        chunksize=chunk_lines,
    ):
        missing = set(DATA_CSV_HEADER) - set(chunk.columns)
        if missing:
            raise ValueError(f"data.csv missing columns: {sorted(missing)}")
        yield chunk


class ChunkedUploader:
    """Server side of the upload: receives chunks, assembles relations.

    One instance per upload session, mirroring the demo's per-request
    accumulation before the dataset is committed to the store.
    """

    def __init__(self, spark: SparkSession, store: DatasetStore, name: str,
                 interval_minutes: int = 60):
        self.spark = spark
        self.store = store
        self.name = name
        self.interval_minutes = interval_minutes
        self._chunks: list[pd.DataFrame] = []
        self.n_chunks_received = 0

    def receive_chunk(self, chunk: pd.DataFrame) -> None:
        self._chunks.append(chunk)
        self.n_chunks_received += 1

    def commit(self, locations: pd.DataFrame, attributes: list[str]) -> dict:
        """Finalize: convert timestamps → ticks, persist, return stats."""
        if not self._chunks:
            raise ValueError("no chunks received")
        data = pd.concat(self._chunks, ignore_index=True)
        unknown = set(data["attribute"]) - set(attributes)
        if unknown:
            raise ValueError(f"data.csv attributes not in attribute.csv: {sorted(unknown)}")
        start = str(pd.to_datetime(data["time"]).min())
        readings = pd.DataFrame(
            {
                "sensor_id": data["id"],
                "t": timestamps_to_ticks(data["time"], start, self.interval_minutes),
                "value": pd.to_numeric(data["data"], errors="coerce"),
            }
        )
        self.store.save(
            self.name,
            self.spark.createDataFrame(readings, schema=READINGS_SCHEMA),
            self.spark.createDataFrame(locations, schema=LOCATIONS_SCHEMA),
            attributes,
            meta={
                "start": start,
                "interval_minutes": self.interval_minutes,
                "n_records": int(len(readings)),
                "n_chunks": self.n_chunks_received,
            },
        )
        return {"n_records": int(len(readings)), "n_chunks": self.n_chunks_received,
                "start": start}


def upload_csv_bundle(
    spark: SparkSession,
    store: DatasetStore,
    name: str,
    directory: str | Path,
    chunk_lines: int = CHUNK_LINES,
    interval_minutes: int = 60,
) -> dict:
    """End-to-end upload of a §3.2 CSV bundle directory."""
    directory = Path(directory)
    uploader = ChunkedUploader(spark, store, name, interval_minutes)
    for chunk in iter_data_chunks(directory / "data.csv", chunk_lines):
        uploader.receive_chunk(chunk)
    return uploader.commit(
        read_location_csv(directory / "location.csv"),
        read_attribute_csv(directory / "attribute.csv"),
    )
