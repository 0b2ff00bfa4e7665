"""Storage substrate replacing the paper's MongoDB (§3.4): a JSON
document store over the local filesystem, a parquet dataset store, and
the CAP result cache of §3.3."""
from repro.store.docstore import DocumentStore  # noqa: F401
from repro.store.datasets import DatasetStore  # noqa: F401
from repro.store.cache import CapCache  # noqa: F401
