"""IR queries on the database: all_streamlets, split_streams, and
incremental behaviour on point updates."""
import pytest

from repro.core.ir import Interface, Port, PortMode, Streamlet
from repro.core.types import Bits, Stream
from repro.query.queries import TydiDB
from repro.til import parse_project

SRC = """
namespace my::example::space {
    type stream = Stream(data: Bits(54), complexity: 2);
    streamlet comp1 = (a: in stream, b: out stream);
    streamlet comp2 = (x: in stream, y: out stream);
}
"""


@pytest.fixture()
def db():
    d = TydiDB()
    d.load_project(parse_project(SRC))
    return d


class TestAllStreamlets:
    def test_primary_output(self, db):
        assert db.all_streamlets() == (
            ("my::example::space", "comp1"),
            ("my::example::space", "comp2"),
        )

    def test_memoized(self, db):
        db.all_streamlets()
        db.stats.reset()
        db.all_streamlets()
        assert db.stats.recomputes == 0
        assert db.stats.hits == 1


class TestSplitStreams:
    def test_per_port_physical_streams(self, db):
        split = db.split_streams("my::example::space", "comp1")
        assert [(p, m) for p, m, _ in split] == [("a", "in"), ("b", "out")]
        (_, _, phys) = split[0]
        assert phys[0].element_width == 54

    def test_cached_until_streamlet_changes(self, db):
        db.split_streams("my::example::space", "comp1")
        db.stats.reset()
        db.split_streams("my::example::space", "comp1")
        assert db.stats.recomputes == 0

    def test_point_update_invalidates_only_that_streamlet(self, db):
        ns = "my::example::space"
        db.split_streams(ns, "comp1")
        db.split_streams(ns, "comp2")
        db.set_streamlet(
            ns,
            "comp1",
            Streamlet(
                Interface(
                    (
                        Port("a", PortMode.IN, Stream(data=Bits(10), complexity=2)),
                        Port("b", PortMode.OUT, Stream(data=Bits(10), complexity=2)),
                    )
                )
            ),
        )
        db.stats.reset()
        split1 = db.split_streams(ns, "comp1")
        split2 = db.split_streams(ns, "comp2")
        assert split1[0][2][0].element_width == 10
        assert split2[0][2][0].element_width == 54
        # comp1 recomputed (streamlet + split), comp2 fully cached.
        assert db.stats.recomputes == 2

    def test_reload_same_project_is_free(self, db):
        db.all_streamlets()
        rev = db.revision
        db.load_project(parse_project(SRC))
        assert db.revision == rev


class TestNewStreamlet:
    def test_set_streamlet_extends_all_streamlets(self, db):
        ns = "my::example::space"
        db.all_streamlets()
        db.set_streamlet(
            ns,
            "comp3",
            Streamlet(
                Interface((Port("p", PortMode.IN, Stream(data=Bits(1))),))
            ),
        )
        assert (ns, "comp3") in db.all_streamlets()
