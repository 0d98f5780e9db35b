"""Query-system incrementality benchmark (paper Section 7.1).

The claimed benefit of the Salsa-style database: "results of previously
executed queries are automatically stored, and only re-computed when
their dependencies change." Measured here as whole-project VHDL
emission over a generated 120-streamlet project:

* cold    — empty memo tables, everything computes;
* warm    — nothing changed, everything verified from memo;
* 1-touch — one streamlet's declaration changed, only its dependent
            queries recompute.
"""
import pytest

from repro.core.ir import Interface, Port, PortMode, Streamlet
from repro.core.types import Bits, Stream
from repro.query.queries import TydiDB
from repro.vhdl import emit_project, register_vhdl_queries

N_STREAMLETS = 120


def make_db() -> TydiDB:
    db = register_vhdl_queries(TydiDB())
    db.set_input("namespaces", ("gen",))
    names = tuple(f"s{i}" for i in range(N_STREAMLETS))
    db.set_input("streamlet_names", "gen", names)
    for i, name in enumerate(names):
        t = Stream(data=Bits(8 + i % 32), complexity=1 + i % 8, dimensionality=i % 3)
        db.set_input(
            "streamlet",
            "gen",
            name,
            Streamlet(
                Interface((Port("i", PortMode.IN, t), Port("o", PortMode.OUT, t)))
            ),
        )
    return db


def touched_streamlet(i: int) -> Streamlet:
    t = Stream(data=Bits(17), complexity=3)
    return Streamlet(
        Interface((Port("i", PortMode.IN, t), Port("o", PortMode.OUT, t)))
    )


@pytest.mark.benchmark(group="query-system")
def test_cold_emission(benchmark):
    def cold():
        return emit_project(make_db())

    text = benchmark(cold)
    assert f"gen__s{N_STREAMLETS - 1}_com" in text


@pytest.mark.benchmark(group="query-system")
def test_warm_emission(benchmark):
    db = make_db()
    emit_project(db)

    text = benchmark(lambda: emit_project(db))
    db.stats.reset()
    emit_project(db)
    assert db.stats.recomputes == 0  # fully memoized
    assert "gen__s0_com" in text


@pytest.mark.benchmark(group="query-system")
def test_incremental_one_touch(benchmark, counter=[0]):
    db = make_db()
    emit_project(db)

    def touch_and_emit():
        counter[0] += 1
        db.set_input("streamlet", "gen", "s0", touched_streamlet(counter[0]))
        return emit_project(db)

    benchmark(touch_and_emit)
    # Only s0's chain (streamlet, split, component, entity, arch) plus
    # the aggregating package/project recompute — not the other 119.
    counter[0] += 1
    db.set_input("streamlet", "gen", "s0", touched_streamlet(counter[0]))
    db.stats.reset()
    emit_project(db)
    assert db.stats.recomputes <= 10, db.stats


def test_incremental_is_much_cheaper_than_cold():
    """The shape claim, independent of wall-clock: a one-streamlet
    touch recomputes O(1) queries, a cold start O(N)."""
    db = make_db()
    db.stats.reset()
    emit_project(db)
    cold = db.stats.recomputes
    db.set_input("streamlet", "gen", "s0", touched_streamlet(999))
    db.stats.reset()
    emit_project(db)
    touch = db.stats.recomputes
    assert cold > N_STREAMLETS * 3
    assert touch <= 10
    print(f"\nquery recomputes: cold={cold} one-touch={touch} (N={N_STREAMLETS})")
