"""Memory-budgeted mini-batch storage — the paper's 15 GB-RAM substrate."""
from repro.storage.store import BatchStore  # noqa: F401
