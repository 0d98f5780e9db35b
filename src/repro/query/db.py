"""A Salsa-style demand-driven query database.

The paper's prototype stores and computes IR information in a query
system inspired by the Rust compiler's demand-driven compilation and
implemented with the Salsa framework (Section 7.1): results of
previously executed queries are automatically stored and only
re-computed when their dependencies change.

This is a faithful Python re-implementation of that mechanism:

* **inputs** are keyed values with a *changed-at* revision;
* **queries** are registered pure functions of the database; while a
  query runs, every input read and every sub-query call is recorded as
  a dependency;
* a global *revision* counter advances on every input write;
* on lookup, a memoized result is reused if none of its dependencies
  changed since it was last verified (the check recurses, depth-first);
* **early cutoff**: when a dependency did change but the recomputed
  value compares equal to the memoized one, the entry's *changed-at*
  revision is left untouched, so queries depending on it remain valid.

Hit/miss/recompute counters are exposed for the incrementality
benchmark (``benchmarks/bench_query_system.py``).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Callable, Dict, Hashable, List, Optional, Tuple

DepKey = Tuple[str, Tuple[Hashable, ...]]  # ("input"|query_name, key/args)


class QueryError(RuntimeError):
    """Raised for unknown queries/inputs or dependency cycles."""


@dataclass
class _Memo:
    value: Any
    changed_at: int
    verified_at: int
    deps: Tuple[DepKey, ...]


@dataclass
class QueryStats:
    """Counters for evaluating the benefit of memoization."""

    hits: int = 0
    recomputes: int = 0
    input_reads: int = 0

    def reset(self) -> None:
        self.hits = self.recomputes = self.input_reads = 0


class QueryDB:
    """The query database: keyed inputs plus registered query functions."""

    def __init__(self) -> None:
        self._inputs: Dict[Tuple[Hashable, ...], Tuple[Any, int]] = {}
        self._queries: Dict[str, Callable[..., Any]] = {}
        self._memo: Dict[DepKey, _Memo] = {}
        self._revision = 0
        self._active: List[List[DepKey]] = []  # dependency-recording stack
        self._in_flight: set = set()
        self.stats = QueryStats()

    # -- inputs ----------------------------------------------------------

    def set_input(self, *key_and_value: Any) -> None:
        """``set_input(k1, k2, ..., value)``: write an input, advancing
        the revision only if the value actually changed."""
        *key, value = key_and_value
        k = tuple(key)
        old = self._inputs.get(k)
        if old is not None and old[0] == value:
            return
        self._revision += 1
        self._inputs[k] = (value, self._revision)

    def remove_input(self, *key: Hashable) -> None:
        if tuple(key) in self._inputs:
            self._revision += 1
            del self._inputs[tuple(key)]

    def get_input(self, *key: Hashable, default: Any = ...) -> Any:
        """Read an input, recording it as a dependency of the query
        currently being computed (if any)."""
        k = tuple(key)
        self.stats.input_reads += 1
        if self._active:
            self._active[-1].append(("input", k))
        if k not in self._inputs:
            if default is not ...:
                return default
            raise QueryError(f"no input {k!r}")
        return self._inputs[k][0]

    def has_input(self, *key: Hashable) -> bool:
        if self._active:
            self._active[-1].append(("input", tuple(key)))
        return tuple(key) in self._inputs

    @property
    def revision(self) -> int:
        return self._revision

    # -- queries ---------------------------------------------------------

    def register(self, fn: Callable[..., Any], name: Optional[str] = None) -> Callable[..., Any]:
        """Register ``fn(db, *args)`` as a query. Usable as a decorator."""
        self._queries[name or fn.__name__] = fn
        return fn

    def query(self, name: str, *args: Hashable) -> Any:
        """Demand a query result, reusing the memoized value when no
        dependency has changed since it was last verified."""
        if name not in self._queries:
            raise QueryError(f"no query {name!r}")
        key: DepKey = (name, args)
        if self._active:
            self._active[-1].append(key)
        if key in self._in_flight:
            raise QueryError(f"dependency cycle through {key!r}")

        memo = self._memo.get(key)
        if memo is not None:
            if memo.verified_at == self._revision:
                self.stats.hits += 1
                return memo.value
            if not self._any_dep_changed(memo):
                memo.verified_at = self._revision
                self.stats.hits += 1
                return memo.value
        return self._recompute(key)

    def _any_dep_changed(self, memo: _Memo) -> bool:
        for kind, sub in memo.deps:
            if kind == "input":
                inp = self._inputs.get(sub)
                changed_at = inp[1] if inp is not None else self._revision
                if changed_at > memo.verified_at:
                    return True
            else:
                if self._changed_since(kind, sub, memo.verified_at):
                    return True
        return False

    def _changed_since(self, name: str, args: Tuple[Hashable, ...], rev: int) -> bool:
        """Did query (name, args) change after revision ``rev``?
        May recompute the dependency to find out (early cutoff keeps
        ``changed_at`` stable when the recomputed value is equal)."""
        key: DepKey = (name, args)
        memo = self._memo.get(key)
        if memo is None:
            self._recompute(key)
            memo = self._memo[key]
        elif memo.verified_at != self._revision:
            if self._any_dep_changed(memo):
                self._recompute(key)
                memo = self._memo[key]
            else:
                memo.verified_at = self._revision
        return memo.changed_at > rev

    def _recompute(self, key: DepKey) -> Any:
        name, args = key
        self.stats.recomputes += 1
        self._in_flight.add(key)
        self._active.append([])
        try:
            value = self._queries[name](self, *args)
        finally:
            deps = tuple(dict.fromkeys(self._active.pop()))
            self._in_flight.discard(key)
        old = self._memo.get(key)
        changed_at = (
            old.changed_at if old is not None and old.value == value else self._revision
        )
        self._memo[key] = _Memo(value, changed_at, self._revision, deps)
        return value
