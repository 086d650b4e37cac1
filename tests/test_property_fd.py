"""Property-based tests (hypothesis) for the pure FD machinery and the
pandas-backend miners — no Spark needed."""
import pandas as pd
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.fd.bruteforce import brute_force_fds
from repro.fd.engine import FDEngine
from repro.fd.fastfds import fastfds
from repro.fd.lattice import mine_fds
from repro.fd.model import FD, by_rhs, closure, has_subset_fd, minimize

ATTRS = ["a", "b", "c", "d"]


@st.composite
def tables(draw, max_rows=14):
    n = draw(st.integers(min_value=1, max_value=max_rows))
    cols = {}
    for a in ATTRS:
        card = draw(st.integers(min_value=1, max_value=3))
        cols[a] = draw(
            st.lists(
                st.integers(min_value=0, max_value=card), min_size=n, max_size=n
            )
        )
    return pd.DataFrame(cols)


@st.composite
def fd_sets(draw):
    n = draw(st.integers(min_value=0, max_value=6))
    out = set()
    for _ in range(n):
        rhs = draw(st.sampled_from(ATTRS))
        lhs = draw(
            st.frozensets(st.sampled_from(ATTRS), max_size=3).map(
                lambda s, r=rhs: s - {r}
            )
        )
        out.add(FD(lhs, rhs))
    return out


class TestMinerProperties:
    @settings(max_examples=40, deadline=None)
    @given(tables())
    def test_lattice_equals_bruteforce(self, pdf):
        assert mine_fds(FDEngine(pdf), ATTRS) == brute_force_fds(pdf)

    @settings(max_examples=25, deadline=None)
    @given(tables())
    def test_fastfds_equals_bruteforce(self, pdf):
        assert fastfds(pdf) == brute_force_fds(pdf)

    @settings(max_examples=25, deadline=None)
    @given(tables())
    def test_every_mined_fd_holds(self, pdf):
        e = FDEngine(pdf)
        for d in mine_fds(e, ATTRS):
            assert e.holds(d.lhs_set(), d.rhs)

    @settings(max_examples=25, deadline=None)
    @given(tables())
    def test_selection_preserves_fds(self, pdf):
        """Theorem 1 (σ case) as a property: filtering rows never
        invalidates an FD."""
        before = brute_force_fds(pdf)
        sel = pdf[pdf["a"] <= 1]
        after = brute_force_fds(sel)
        for d in before:
            assert d.rhs in closure(d.lhs, after)


class TestModelProperties:
    @settings(max_examples=50, deadline=None)
    @given(fd_sets())
    def test_minimize_is_antichain(self, fds):
        out = minimize(fds)
        for d in out:
            for e in out:
                if d is not e and d.rhs == e.rhs:
                    assert not d.lhs_set() < e.lhs_set()

    @settings(max_examples=50, deadline=None)
    @given(fd_sets())
    def test_minimize_preserves_implication(self, fds):
        out = minimize(fds)
        idx = by_rhs(out)
        for d in fds:
            assert has_subset_fd(idx, d.lhs_set(), d.rhs)

    @settings(max_examples=50, deadline=None)
    @given(fd_sets(), st.frozensets(st.sampled_from(ATTRS), max_size=4))
    def test_closure_monotone_and_idempotent(self, fds, attrs):
        c1 = closure(attrs, fds)
        assert attrs <= c1
        assert closure(c1, fds) == c1
