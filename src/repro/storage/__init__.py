"""Storage manager (paper §3, Figure 4): node property store + edge stream."""
from repro.storage.store import GraphStore  # noqa: F401
