"""The paper's theorems and lemmas, encoded as executable properties."""
import pandas as pd
import pytest

from repro.fd.bruteforce import brute_force_fds
from repro.fd.model import FD, closure
from tests.helpers import random_join_pair, random_table


def _join(L, R, k="k", how="inner"):
    return L.merge(R, on=k, how=how)


class TestTheorem1:
    """fds(π) ⊆ D, fds(σ) ⊇ D, fds(join) ⊇ D1 ∪ D2 (restricted to the
    surviving side for tuple-dropping joins on null-free data)."""

    @pytest.mark.parametrize("seed", range(5))
    def test_selection_only_adds(self, seed):
        pdf = random_table(seed, n=30)
        d_before = brute_force_fds(pdf)
        sel = pdf[pdf["a"] < 2]
        d_after = brute_force_fds(sel)
        # every FD before still holds (may be non-minimal now)
        for d in d_before:
            assert d.rhs in closure(d.lhs, d_after), str(d)

    @pytest.mark.parametrize("seed", range(5))
    def test_projection_only_removes(self, seed):
        pdf = random_table(seed + 10, n=30)
        cols = ["a", "b", "c"]
        d_full = brute_force_fds(pdf)
        d_proj = brute_force_fds(pdf[cols])
        # FDs of the projection are exactly the full FDs within the columns
        assert d_proj == {d for d in d_full if d.attrs() <= set(cols)}

    @pytest.mark.parametrize("seed", range(5))
    def test_join_preserves_side_fds(self, seed):
        L, R = random_join_pair(seed)
        j = _join(L, R)
        d_join = brute_force_fds(j)
        # FDs of the semijoin-reduced sides persist in the join
        for side, keep in ((L[L.k.isin(R.k)], L.columns), (R[R.k.isin(L.k)], R.columns)):
            for d in brute_force_fds(side):
                assert d.rhs in closure(d.lhs, d_join), str(d)


class TestLemma2Upstaged:
    def test_upstaged_by_tuple_removal(self):
        # violating tuple has no join partner -> FD becomes valid (Example 2)
        L = pd.DataFrame(
            {"k": [1, 2, 9], "flag": [0, 1, 0], "v": [5, 6, 7]}
        )  # flag -> v violated only by row k=9
        R = pd.DataFrame({"k": [1, 2], "w": [3, 3]})
        assert FD(["flag"], "v") not in brute_force_fds(L)
        reduced = L[L.k.isin(R.k)]
        assert FD(["flag"], "v") in brute_force_fds(reduced)
        assert FD(["flag"], "v") in brute_force_fds(_join(L, R))


class TestLemma3:
    @pytest.mark.parametrize("seed", range(6))
    def test_no_cross_fd_without_key_fd(self, seed):
        L, R = random_join_pair(seed + 40)
        j = _join(L, R)
        d = brute_force_fds(j)
        for rhs in ("x", "y"):
            if rhs not in closure(["k"], d):
                # K does not determine rhs => no pure-left lhs determines it
                for fd in d:
                    if fd.rhs == rhs:
                        assert not fd.lhs_set() <= {"a", "b", "c"}, str(fd)


class TestTheorem2Transitivity:
    @pytest.mark.parametrize("seed", range(6))
    def test_a_to_k_k_to_b_implies_a_to_b(self, seed):
        L, R = random_join_pair(seed + 80)
        j = _join(L, R)
        d = brute_force_fds(j)
        # c = k % 3 does not determine k in general; but whenever A->k and
        # k->b hold on the join, A->b must hold.
        for lhs in (frozenset(["a"]), frozenset(["a", "b"]), frozenset(["c", "a"])):
            cl = closure(lhs, d)
            if "k" in cl:
                for b in ("x", "y"):
                    assert b in cl, (seed, sorted(lhs), b)


class TestTheorem3Counterexample:
    """The paper's proof tables: AA' -> b holds on the join but is not
    Armstrong-derivable from the side FDs."""

    def L(self):
        return pd.DataFrame({"k": [0, 1, 1, 2], "A": [0, 0, 1, 2]})

    def R(self):
        return pd.DataFrame({"k": [0, 1, 1, 2], "Ap": [0, 0, 1, 1], "b": [0, 0, 1, 0]})

    def test_join_fd_exists(self):
        j = _join(self.L(), self.R())
        d = brute_force_fds(j)
        assert "b" in closure(["A", "Ap"], d)

    def test_not_inferable_from_sides(self):
        dl = brute_force_fds(self.L())
        dr = brute_force_fds(self.R())
        # transitivity through k is unavailable: {A,Ap} does not determine k
        assert "k" not in closure(["A"], dl)
        assert "b" not in closure(["Ap"], dr)


class TestTheorem4:
    @pytest.mark.parametrize("seed", range(6))
    def test_join_fd_implies_key_family_fd(self, seed):
        L, R = random_join_pair(seed + 120)
        j = _join(L, R)
        d = brute_force_fds(j)
        # For every valid cross FD C -> b with b on the right side,
        # K ∪ (C ∩ right) -> b must hold too.
        right_excl = {"x", "y"}
        for fd in d:
            if fd.rhs in right_excl and not fd.lhs_set() <= right_excl | {"k"}:
                fam = frozenset({"k"} | (fd.lhs_set() & right_excl))
                assert fd.rhs in closure(fam, d), str(fd)
