"""Behaviour registry: linked implementations for the Spark target.

A Streamlet's *linked implementation* points at behaviour in a target
language (paper Section 5.2: links are directories/paths, and "how
these links are used is left up to the backend"). For the Spark
backend a link of the form ``spark://<key>`` resolves to a Python
function registered under ``<key>``:

``fn(inputs: Dict[port, DataFrame]) -> Dict[port, DataFrame]``

Streamlets without a link fall back to a behaviour registered under
their fully qualified declaration name (``ns::name``) — the analogue of
the VHDL backend looking for an appropriately named ``.vhd`` file.
"""
from __future__ import annotations

from typing import Callable, Dict

from pyspark.sql import DataFrame

Behavior = Callable[[Dict[str, DataFrame]], Dict[str, DataFrame]]


class BehaviorNotFound(KeyError):
    """No behaviour registered for a Streamlet (and it has no
    structural implementation to fall back on)."""


class BehaviorRegistry:
    """Mutable mapping of behaviour keys to DataFrame transformations.

    Substitution (paper Section 6.2) falls out of the design: re-register
    a key — or register a stub under a test-only key and link a variant
    Streamlet to it — to substitute a dependency for testing.
    """

    def __init__(self) -> None:
        self._behaviors: Dict[str, Behavior] = {}

    def register(self, key: str, fn: Behavior = None):
        """Register a behaviour; usable as ``@registry.register("key")``."""
        if fn is None:
            def deco(f: Behavior) -> Behavior:
                self._behaviors[key] = f
                return f
            return deco
        self._behaviors[key] = fn
        return fn

    def get(self, key: str) -> Behavior:
        try:
            return self._behaviors[key]
        except KeyError:
            raise BehaviorNotFound(
                f"no Spark behaviour registered under {key!r}"
            ) from None

    def has(self, key: str) -> bool:
        return key in self._behaviors

    def substitute(self, key: str, fn: Behavior) -> Behavior:
        """Replace the behaviour under ``key`` (for testing), returning
        the previous one so callers can restore it."""
        old = self._behaviors.get(key)
        self._behaviors[key] = fn
        return old
