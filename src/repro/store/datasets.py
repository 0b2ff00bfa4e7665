"""Dataset store: named datasets persisted as parquet + a metadata
document, so "we can use the dataset without re-uploading by specifying
the dataset name" (paper §3.2).
"""
from __future__ import annotations

from pathlib import Path

from pyspark.sql import DataFrame, SparkSession

from repro.store.docstore import DocumentStore


class DatasetStore:
    """Named (readings, locations) pairs on the local filesystem.

    Readings/locations are parquet directories; attributes and upload
    metadata live in the ``datasets`` collection of the document store.
    """

    def __init__(self, root: str | Path):
        self.root = Path(root)
        self.docs = DocumentStore(self.root / "docs")

    def save(
        self,
        name: str,
        readings: DataFrame,
        locations: DataFrame,
        attributes: list[str],
        meta: dict | None = None,
    ) -> None:
        base = self.root / "data" / name
        readings.write.mode("overwrite").parquet(str(base / "readings"))
        locations.write.mode("overwrite").parquet(str(base / "locations"))
        self.docs.insert(
            "datasets",
            {"name": name, "attributes": attributes, "meta": meta or {}},
            doc_id=name,
        )

    def exists(self, name: str) -> bool:
        return self.docs.get("datasets", name) is not None

    def names(self) -> list[str]:
        return sorted(d["name"] for d in self.docs.find("datasets"))

    def load(self, spark: SparkSession, name: str) -> tuple[DataFrame, DataFrame, dict]:
        """→ (readings, locations, metadata doc). Raises KeyError if absent."""
        doc = self.docs.get("datasets", name)
        if doc is None:
            raise KeyError(f"dataset {name!r} not uploaded")
        base = self.root / "data" / name
        return (
            spark.read.parquet(str(base / "readings")),
            spark.read.parquet(str(base / "locations")),
            doc,
        )
