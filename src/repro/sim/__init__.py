"""Cycle-level physical-stream transfer simulator (Figure 1 semantics)."""

from .transfers import Transfer, deserialize, serialize  # noqa: F401
from .validate import TraceError, validate_trace  # noqa: F401
