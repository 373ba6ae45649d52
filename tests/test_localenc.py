"""Unit tests for the memoized local panel-encoding solver."""
import pytest

from repro.core import localenc as L
from repro.core.localenc import U, A, A0, A1, B, B0, B1, C, C0, C1


def apply_cover(panel, edges):
    """Total signed coverage of an edge list over the panel's atom pairs."""
    tot = [0] * len(panel.pairs)
    for x, y, s in edges:
        cov = panel.covvec(x, y)
        for i in range(len(tot)):
            tot[i] += s * cov[i]
    return tot


class TestPanelGeometry:
    def test_case1_both_leaves_atoms(self):
        p = L.case1_panel(1, 1, (True, True))
        assert p.con[A] == frozenset([0])
        assert p.con[B] == frozenset([1])
        assert p.con[U] == frozenset([0, 1])
        # only relevant pair is the cross pair (both atoms singleton)
        assert p.pairs == [(0, 1)]

    def test_case1_internal_sides(self):
        p = L.case1_panel(2, 2, (False, True, False, True))
        assert p.con[A] == frozenset([0, 1])
        assert p.con[A0] == frozenset([0])
        assert p.con[B1] == frozenset([3])
        # (0,0) and (2,2) relevant (non-singleton), 6 cross pairs
        assert set(p.pairs) == {(0, 0), (2, 2), (0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3)}

    def test_case1_loop_slots(self):
        p = L.case1_panel(2, 1, (True, True, True))
        loops = [s for s, _ in p.slots if s[0] == s[1]]
        # U loop and A loop (|A|>=2); no loops on singleton atoms
        assert (U, U) in loops and (A, A) in loops
        assert (A0, A0) not in loops and (B, B) not in loops

    def test_case1_no_ancestor_slots(self):
        p = L.case1_panel(2, 2, (True,) * 4)
        labels = [s for s, _ in p.slots]
        assert (A, A0) not in labels and (A0, A) not in labels
        assert all(U not in s or s == (U, U) for s in labels)

    def test_case2_pairs_are_cross_only(self):
        p = L.case2_panel(2, 1, 2)
        # 3 yellow atoms x 2 C atoms
        assert len(p.pairs) == 6
        assert all(g < 3 <= h for g, h in p.pairs)

    def test_case2_slots_cross_only(self):
        p = L.case2_panel(1, 1, 1)
        labels = [s for s, _ in p.slots]
        assert all(y in (C, C0, C1) for _, y in labels)
        assert (U, C) in labels

    def test_covvec_uloop_covers_everything(self):
        p = L.case1_panel(2, 2, (False,) * 4)
        assert all(v == 1 for v in p.covvec(U, U))

    def test_covvec_ancestor_edge_for_removals(self):
        # removals may include odd historical edges like (A, A0)-style pairs;
        # coverage math must handle them even though they are not slots
        p = L.case1_panel(2, 1, (False, False, True))
        cov = p.covvec(A, A0)
        covered = {p.pairs[i] for i, v in enumerate(cov) if v}
        assert covered == {(0, 0), (0, 1)}


class TestSolveCase1:
    def test_empty_removal_noop(self):
        assert L.solve_case1(1, 1, (True, True), []) in ([], None)

    def test_single_cross_edge_stays_size_one(self):
        # two singletons with one edge between them: optimal size is 1
        # (ties are accepted and re-encoded upward, e.g. as a U-loop)
        removed = [(A, B, 1)]
        sol = L.solve_case1(1, 1, (True, True), removed)
        assert sol is not None and len(sol) == 1
        panel = L.case1_panel(1, 1, (True, True))
        assert apply_cover(panel, sol) == apply_cover(panel, removed)

    def test_dense_merge_collapses_to_uloop(self):
        # A, B internally dense + complete bipartite across: p(A,A), p(B,B),
        # p(A,B) -> single p-loop on U (the canonical hierarchy win)
        removed = [(A, A, 1), (B, B, 1), (A, B, 1)]
        sol = L.solve_case1(2, 2, (False, False, False, False), removed)
        assert sol == [(U, U, 1)]

    def test_dense_minus_cross_tie_preserves_coverage(self):
        # A and B dense internally, no edges across: p(U,U) + n(A,B) ties the
        # old {p(A,A), p(B,B)} at 2 edges -> a tie is accepted, coverage kept
        removed = [(A, A, 1), (B, B, 1)]
        sol = L.solve_case1(2, 2, (False, False, False, False), removed)
        assert sol is not None and len(sol) == 2
        panel = L.case1_panel(2, 2, (False, False, False, False))
        assert apply_cover(panel, sol) == apply_cover(panel, removed)

    def test_near_complete_exception(self):
        # everything dense except atoms a0-b0 disconnected:
        # old: p(A,A),p(B,B),p(A,B) minus n(A0,B0) -> p(U,U)+n(A0,B0) saves 2
        removed = [(A, A, 1), (B, B, 1), (A, B, 1), (A0, B0, -1)]
        sol = L.solve_case1(2, 2, (False,) * 4, removed)
        assert sol is not None and len(sol) == 2
        panel = L.case1_panel(2, 2, (False,) * 4)
        assert apply_cover(panel, sol) == apply_cover(panel, removed)

    def test_solution_restores_coverage_exactly(self):
        import itertools
        panel = L.case1_panel(2, 2, (False, True, False, True))
        cases = [
            [(A, B, 1), (A0, B0, 1), (A, A, 1)],
            [(A0, B0, 1), (A0, B1, 1), (A1, B0, 1), (A1, B1, 1)],
            [(A, B, 1), (A1, B1, -1)],
            [(B, B, 1), (A0, B, 1), (A1, B, 1)],
        ]
        for removed in cases:
            sol = L.solve_case1(2, 2, (False, True, False, True), removed)
            if sol is not None:
                assert len(sol) <= len(removed)
                assert apply_cover(panel, sol) == apply_cover(panel, removed)

    def test_bipartite_complete_across_leaf_sides(self):
        # p(A,B) on internal sides fully covering: stays size 1 (possibly
        # re-expressed at an equal-size position)
        removed = [(A, B, 1)]
        sol = L.solve_case1(2, 2, (True,) * 4, removed)
        assert sol is not None and len(sol) == 1
        panel = L.case1_panel(2, 2, (True,) * 4)
        assert apply_cover(panel, sol) == apply_cover(panel, removed)


class TestSolveCase2:
    def test_shared_neighbor_consolidates(self):
        # both A and B fully connected to C: p(A,C) + p(B,C) -> p(U,C)
        sol = L.solve_case2(1, 1, 1, [(A, C, 1), (B, C, 1)])
        assert sol == [(U, C, 1)]

    def test_partial_no_gain(self):
        removed = [(A, C, 1)]
        sol = L.solve_case2(1, 1, 1, removed)
        assert sol is not None and len(sol) == 1
        panel = L.case2_panel(1, 1, 1)
        assert apply_cover(panel, sol) == apply_cover(panel, removed)

    def test_consolidate_to_c_child(self):
        # A and B each connected to both children of C separately
        removed = [(A, C0, 1), (B, C0, 1), (A, C1, 1), (B, C1, 1)]
        sol = L.solve_case2(1, 1, 2, removed)
        assert sol is not None and len(sol) == 1
        panel = L.case2_panel(1, 1, 2)
        assert apply_cover(panel, sol) == apply_cover(panel, removed)
        assert sol[0][:2] == (U, C)

    def test_exception_pattern(self):
        # single edge: solution cannot be smaller than 1
        removed = [(A, C, 1)]
        sol = L.solve_case2(2, 1, 1, removed)
        assert sol is not None and len(sol) == 1
        panel = L.case2_panel(2, 1, 1)
        assert apply_cover(panel, sol) == apply_cover(panel, removed)

    def test_coverage_preserved_random(self):
        import random
        rng = random.Random(7)
        panel = L.case2_panel(2, 2, 2)
        labels_y = [A, A0, A1, B, B0, B1]
        labels_c = [C, C0, C1]
        for _ in range(30):
            removed = []
            for __ in range(rng.randint(1, 5)):
                removed.append(
                    (rng.choice(labels_y), rng.choice(labels_c), rng.choice([1, -1]))
                )
            sol = L.solve_case2(2, 2, 2, removed)
            if sol is not None:
                assert len(sol) <= len(removed)
                assert apply_cover(panel, sol) == apply_cover(panel, removed)


class TestMemoization:
    def test_memo_grows_and_hits(self):
        before = L.memo_size()
        L.solve_case1(1, 1, (True, True), [(A, B, 1)])
        mid = L.memo_size()
        L.solve_case1(1, 1, (True, True), [(A, B, 1)])
        assert L.memo_size() == mid >= before

    def test_memo_independent_of_labels_only_structure(self):
        # same structural case twice -> single memo entry growth
        base = L.memo_size()
        L.solve_case2(1, 1, 1, [(A, C, 1), (B, C, 1)])
        grew = L.memo_size() - base
        L.solve_case2(1, 1, 1, [(A, C, 1), (B, C, 1)])
        assert L.memo_size() - base == grew
