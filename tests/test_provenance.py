"""Provenance-triple machinery tests."""
from repro.core import provenance as P
from repro.core.provenance import (
    Triple,
    count_by_type,
    dedupe_triples,
    minimize_triples,
    restrict_triples,
)
from repro.fd.model import FD
from tests.helpers import fdset


def _t(s, typ, sub="Q"):
    (fd,) = fdset(s)
    return Triple(fd, typ, sub)


class TestDedupe:
    def test_earliest_type_wins(self):
        triples = [_t("a->b", P.JOIN_FD), _t("a->b", P.BASE), _t("a->b", P.INFERRED)]
        out = dedupe_triples(triples)
        assert len(out) == 1 and out[0].type == P.BASE

    def test_upstaged_before_inferred(self):
        out = dedupe_triples([_t("a->b", P.INFERRED), _t("a->b", P.UPSTAGED_LEFT)])
        assert out[0].type == P.UPSTAGED_LEFT

    def test_distinct_fds_kept(self):
        out = dedupe_triples([_t("a->b", P.BASE), _t("a->c", P.BASE)])
        assert len(out) == 2


class TestMinimize:
    def test_nonminimal_dropped(self):
        out = minimize_triples([_t("a,b->c", P.BASE), _t("a->c", P.UPSTAGED_LEFT)])
        assert [t.fd for t in out] == [FD(["a"], "c")]
        assert out[0].type == P.UPSTAGED_LEFT

    def test_restrict(self):
        out = restrict_triples(
            [_t("a->b", P.BASE), _t("a->x", P.BASE)], {"a", "b"}
        )
        assert [t.fd for t in out] == [FD(["a"], "b")]

    def test_count_by_type(self):
        c = count_by_type([_t("a->b", P.BASE), _t("a->c", P.BASE), _t("b->c", P.JOIN_FD)])
        assert c[P.BASE] == 2 and c[P.JOIN_FD] == 1 and c[P.INFERRED] == 0

    def test_deterministic_order(self):
        out = minimize_triples([_t("b->c", P.BASE), _t("a->b", P.BASE)])
        assert [str(t.fd) for t in out] == ["a -> b", "b -> c"]

    def test_str(self):
        assert "base" in str(_t("a->b", P.BASE))


class TestTypeTable:
    def test_all_six_types(self):
        assert set(P.TYPE_PRIORITY) == {
            "base", "upstaged selection", "upstaged left", "upstaged right",
            "inferred", "joinFD",
        }

    def test_priority_ordering(self):
        assert (
            P.TYPE_PRIORITY[P.BASE]
            < P.TYPE_PRIORITY[P.UPSTAGED_SELECTION]
            < P.TYPE_PRIORITY[P.INFERRED]
            < P.TYPE_PRIORITY[P.JOIN_FD]
        )
