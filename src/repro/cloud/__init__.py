"""Cloud-storage substrate: blob store, latency model, concurrent client.

The paper runs against GCP Cloud Storage; this container has no network,
so the substrate stores blobs on the local filesystem and charges every
logical request against a simulated latency clock that reproduces the
paper's affine request-cost model (Fig 2): a near-constant first-byte
latency plus a bandwidth-linear transfer term. See DESIGN.md §3.1.
"""
from repro.cloud.blobstore import BlobStore
from repro.cloud.latency import LatencyModel, REGIONS
from repro.cloud.client import CloudClient, FetchRequest, Ledger

__all__ = [
    "BlobStore",
    "LatencyModel",
    "REGIONS",
    "CloudClient",
    "FetchRequest",
    "Ledger",
]
