"""The Salsa-style query database: memoization, invalidation, early
cutoff (paper Section 7.1)."""
import pytest

from repro.query.db import QueryDB, QueryError


@pytest.fixture()
def db():
    d = QueryDB()

    calls = {"double": 0, "quad": 0, "parity": 0}
    d.calls = calls

    @d.register
    def double(db):
        calls["double"] += 1
        return db.get_input("x") * 2

    @d.register
    def quad(db):
        calls["quad"] += 1
        return db.query("double") * 2

    @d.register
    def parity(db):
        calls["parity"] += 1
        return db.query("double") % 2

    d.set_input("x", 3)
    return d


class TestMemoization:
    def test_results_are_cached(self, db):
        assert db.query("double") == 6
        assert db.query("double") == 6
        assert db.calls["double"] == 1

    def test_transitive_queries(self, db):
        assert db.query("quad") == 12
        assert db.calls == {"double": 1, "quad": 1, "parity": 0}

    def test_on_demand_only(self, db):
        # Nothing computes until demanded.
        assert db.calls["double"] == 0


class TestInvalidation:
    def test_input_change_recomputes(self, db):
        assert db.query("quad") == 12
        db.set_input("x", 5)
        assert db.query("quad") == 20
        assert db.calls["double"] == 2

    def test_unchanged_write_is_free(self, db):
        assert db.query("quad") == 12
        rev = db.revision
        db.set_input("x", 3)  # same value: revision does not advance
        assert db.revision == rev
        assert db.query("quad") == 12
        assert db.calls["quad"] == 1

    def test_unrelated_input_does_not_recompute(self, db):
        db.set_input("y", 99)
        assert db.query("quad") == 12
        db.set_input("y", 100)
        assert db.query("quad") == 12
        assert db.calls["quad"] == 1

    def test_early_cutoff(self, db):
        # x: 3 -> 5 flips the doubled value but not its parity... use
        # parity: double changes (6 -> 10) but parity stays 0, so a
        # query depending on parity must not recompute.
        @db.register
        def shout(d):
            db.calls.setdefault("shout", 0)
            db.calls["shout"] += 1
            return f"parity={d.query('parity')}"

        assert db.query("shout") == "parity=0"
        db.set_input("x", 5)
        assert db.query("shout") == "parity=0"
        # double and parity recomputed, but parity's value was equal,
        # so shout was verified without recomputation.
        assert db.calls["shout"] == 1
        assert db.calls["parity"] == 2


class TestErrors:
    def test_unknown_query(self, db):
        with pytest.raises(QueryError):
            db.query("nope")

    def test_unknown_input(self, db):
        @db.register
        def needs_missing(d):
            return d.get_input("missing")

        with pytest.raises(QueryError):
            db.query("needs_missing")

    def test_input_default(self, db):
        assert db.get_input("missing", default=42) == 42

    def test_cycle_detection(self, db):
        @db.register
        def a(d):
            return d.query("b")

        @db.register
        def b(d):
            return d.query("a")

        with pytest.raises(QueryError, match="cycle"):
            db.query("a")


class TestStats:
    def test_hit_miss_counters(self, db):
        db.query("quad")
        assert db.stats.recomputes == 2  # quad + double
        db.query("quad")
        assert db.stats.hits == 1
        db.stats.reset()
        assert db.stats.hits == 0


class TestParameterizedQueries:
    def test_args_key_separately(self):
        d = QueryDB()
        calls = []

        @d.register
        def get(db, key):
            calls.append(key)
            return db.get_input("v", key)

        d.set_input("v", "a", 1)
        d.set_input("v", "b", 2)
        assert d.query("get", "a") == 1
        assert d.query("get", "b") == 2
        assert d.query("get", "a") == 1
        assert calls == ["a", "b"]

    def test_point_invalidation(self):
        d = QueryDB()

        @d.register
        def get(db, key):
            return db.get_input("v", key)

        d.set_input("v", "a", 1)
        d.set_input("v", "b", 2)
        d.query("get", "a"), d.query("get", "b")
        d.set_input("v", "a", 10)
        d.stats.reset()
        assert d.query("get", "a") == 10
        assert d.query("get", "b") == 2
        assert d.stats.recomputes == 1  # only the touched key
        assert d.stats.hits == 1

    def test_removed_input_invalidates(self):
        d = QueryDB()

        @d.register
        def has(db, key):
            return db.has_input("v", key)

        d.set_input("v", "a", 1)
        assert d.query("has", "a") is True
        d.remove_input("v", "a")
        assert d.query("has", "a") is False
