"""Local re-encoding of p/n-edges around a merger — Cases 1 & 2, memoized.

When roots A and B merge into U = A∪B, SLUGGER re-optimizes:

- **Case 1**: edges *within* the panel {U} ∪ S̄_A ∪ S̄_B (≤7 supernodes;
  S̄_X = X plus its direct children; merge trees are binary during the
  merge phase, so each side contributes ≤3 panel nodes).
- **Case 2**: edges *between* the panel and S̄_C (≤3 more supernodes) for
  each root C connected to the panel by a p/n-edge.

Formulation (DESIGN.md §3.1): every subnode of the panel's trees lies in
exactly one *atom* (a direct child of A/B/C, or the root itself if it is
a leaf). Removing the in-scope edges subtracts a signed *coverage*
``c(g, h)`` from every atom pair; a replacement edge set is exact iff it
restores precisely that coverage. The solver finds a minimum-cardinality
signed edge set over the panel's *slots* (unordered supernode pairs plus
self-loops on supernodes with ≥2 subnodes) restoring ``c`` — via
iterative-deepening DFS with suffix-coverage pruning, results memoized on
the (structure, target) signature. The memo is input-graph independent,
exactly as in the paper ("the memoized results ... can even be used when
summarizing different input graphs").

If no strictly smaller edge set is found within the depth/node budget,
the caller keeps the old edges (always feasible), so the budget bounds
only conciseness, never correctness.

Panel node labels (ints, fixed):
``U=0, A=1, A0=2, A1=3, B=4, B0=5, B1=6, C=7, C0=8, C1=9``.
A leaf side uses only its root label (which is then its single atom).
"""
from __future__ import annotations

from functools import lru_cache

U, A, A0, A1, B, B0, B1, C, C0, C1 = range(10)

MAX_DEPTH = 6  # deepest replacement edge set searched for
NODE_BUDGET = 300_000  # DFS node cap per (structure, target) before giving up

_memo: dict[tuple, tuple | None] = {}


def memo_size() -> int:
    """Number of memoized (structure, target) cases (for tests/telemetry)."""
    return len(_memo)


class _Panel:
    """Precomputed geometry of one panel structure.

    ``con[label]`` is the frozenset of atom indices a panel node contains;
    ``pairs`` lists the relevant atom pairs; ``slots`` the candidate edge
    positions with coverage vectors; ``covvec(x, y)`` gives the coverage of
    an arbitrary label pair (used to score the edges being removed, which
    may sit outside the slot list, e.g. ancestor–descendant leftovers).
    """

    def __init__(self, con: dict[int, frozenset[int]], pairs: list[tuple[int, int]],
                 slot_labels: list[tuple[int, int]]):
        self.con = con
        self.pairs = pairs
        self.pair_index = {p: i for i, p in enumerate(pairs)}
        self.slots = [(s, self.covvec(*s)) for s in slot_labels]

    def covvec(self, x: int, y: int) -> tuple[int, ...]:
        cx, cy = self.con[x], self.con[y]
        out = []
        for g, h in self.pairs:
            if x == y:
                out.append(1 if (g in cx and h in cx) else 0)
            else:
                out.append(
                    1 if ((g in cx and h in cy) or (g in cy and h in cx)) else 0
                )
        return tuple(out)


def _side(base: int, child0: int, child1: int, n_atoms: int, atom_off: int,
          singleton: tuple[bool, ...], con: dict, loopable: list, nodes: list):
    """Register one tree side (root + optional children) into the panel."""
    if n_atoms == 1:
        con[base] = frozenset([atom_off])
        nodes.append(base)
        if not singleton[atom_off]:
            loopable.append(base)
    else:
        con[base] = frozenset([atom_off, atom_off + 1])
        con[child0] = frozenset([atom_off])
        con[child1] = frozenset([atom_off + 1])
        nodes.extend([base, child0, child1])
        loopable.append(base)
        if not singleton[atom_off]:
            loopable.append(child0)
        if not singleton[atom_off + 1]:
            loopable.append(child1)


@lru_cache(maxsize=4096)
def case1_panel(na: int, nb: int, singleton: tuple[bool, ...]) -> _Panel:
    """Panel for Case 1: nodes {U} ∪ S̄_A ∪ S̄_B, atoms indexed A-side
    first. ``singleton[i]`` says atom i holds a single subnode."""
    con: dict[int, frozenset[int]] = {}
    loopable: list[int] = [U]
    a_nodes: list[int] = []
    b_nodes: list[int] = []
    _side(A, A0, A1, na, 0, singleton, con, loopable, a_nodes)
    _side(B, B0, B1, nb, na, singleton, con, loopable, b_nodes)
    con[U] = frozenset(range(na + nb))
    pairs = []
    for i in range(na + nb):
        if not singleton[i]:
            pairs.append((i, i))
        for j in range(i + 1, na + nb):
            pairs.append((i, j))
    slot_labels = [(x, x) for x in loopable]
    # cross-tree pairs
    slot_labels += [(x, y) for x in a_nodes for y in b_nodes]
    # within-side sibling pairs
    if na == 2:
        slot_labels.append((A0, A1))
    if nb == 2:
        slot_labels.append((B0, B1))
    return _Panel(con, pairs, slot_labels)


@lru_cache(maxsize=4096)
def case2_panel(na: int, nb: int, nc: int) -> _Panel:
    """Panel for Case 2: yellow side {U} ∪ S̄_A ∪ S̄_B vs orange side S̄_C.
    Only cross (yellow-atom, C-atom) pairs are in scope; singleton flags
    are irrelevant (cross pairs always involve two distinct subnodes)."""
    con: dict[int, frozenset[int]] = {}
    dummy_flags = (False,) * 6
    loopable: list[int] = []
    y_nodes: list[int] = []
    c_nodes: list[int] = []
    _side(A, A0, A1, na, 0, dummy_flags, con, loopable, y_nodes)
    _side(B, B0, B1, nb, na, dummy_flags, con, loopable, y_nodes)
    _side(C, C0, C1, nc, na + nb, dummy_flags, con, loopable, c_nodes)
    con[U] = frozenset(range(na + nb))
    y_nodes.append(U)
    pairs = [(g, h) for g in range(na + nb) for h in range(na + nb, na + nb + nc)]
    slot_labels = [(x, y) for x in y_nodes for y in c_nodes]
    return _Panel(con, pairs, slot_labels)


class _Budget(Exception):
    pass


def _search(slots: list[tuple[tuple[int, int], tuple[int, ...]]],
            target: tuple[int, ...], max_depth: int) -> list[tuple[tuple[int, int], int]] | None:
    """Min-cardinality signed slot assignment whose coverage sums to
    ``target``; iterative deepening, or None if none exists within bounds."""
    npairs = len(target)
    # big coverage first: finds dense encodings (the hierarchy wins) early
    slots = sorted(slots, key=lambda s: -sum(s[1]))
    nslots = len(slots)
    suffix = [[0] * npairs for _ in range(nslots + 1)]
    for i in range(nslots - 1, -1, -1):
        for p in range(npairs):
            suffix[i][p] = suffix[i + 1][p] + slots[i][1][p]
    state = {"nodes": 0}

    def dfs(idx: int, residual: tuple[int, ...], remaining: int, chosen: list):
        state["nodes"] += 1
        if state["nodes"] > NODE_BUDGET:
            raise _Budget
        if not any(residual):
            return list(chosen)
        if remaining == 0 or idx == nslots:
            return None
        suf = suffix[idx]
        for p in range(npairs):
            if abs(residual[p]) > (remaining if remaining < suf[p] else suf[p]):
                return None
        cov = slots[idx][1]
        for sign in (1, -1):
            newres = tuple(residual[p] - sign * cov[p] for p in range(npairs))
            chosen.append((slots[idx][0], sign))
            r = dfs(idx + 1, newres, remaining - 1, chosen)
            chosen.pop()
            if r is not None:
                return r
        return dfs(idx + 1, residual, remaining, chosen)

    try:
        for depth in range(0, max_depth + 1):
            r = dfs(0, target, depth, [])
            if r is not None:
                return r
    except _Budget:
        return None
    return None


def _solve(panel: _Panel, key: tuple, target: tuple[int, ...], old_size: int):
    """Memoized best replacement strictly smaller than ``old_size``, as a
    list of (label_x, label_y, sign), or None to keep the old edges."""
    if not any(target):
        return []  # removing the edges already restores nothing — drop them
    full_key = (key, target)
    if full_key in _memo:
        sol = _memo[full_key]
    else:
        sol = _search(panel.slots, target, MAX_DEPTH)
        _memo[full_key] = tuple(sol) if sol is not None else None
        sol = _memo[full_key]
    if sol is None or len(sol) > old_size:
        return None
    # equal-cost solutions are accepted: the coverage-first slot ordering
    # concentrates edges on the highest supernodes (U first), which keeps
    # them inside future merges' panels instead of stranding them deep in
    # the hierarchy — the cheap stand-in for the paper's deferred
    # tie-breaking ("chooses one later considering the right next step")
    return [(x, y, s) for (x, y), s in sol]


def solve_case1(na: int, nb: int, singleton: tuple[bool, ...],
                removed: list[tuple[int, int, int]]):
    """Case 1. ``removed`` = current panel-internal edges as
    (label_x, label_y, sign). Returns the replacement edge list (possibly
    []) or None if the old edges are already minimal within bounds."""
    panel = case1_panel(na, nb, singleton)
    target = [0] * len(panel.pairs)
    for x, y, s in removed:
        cov = panel.covvec(x, y)
        for p in range(len(target)):
            target[p] += s * cov[p]
    return _solve(panel, ("c1", na, nb, singleton), tuple(target), len(removed))


def solve_case2(na: int, nb: int, nc: int,
                removed: list[tuple[int, int, int]]):
    """Case 2. ``removed`` = current (yellow panel × S̄_C) edges as
    (label_x, label_y, sign) with the C-side labels C/C0/C1."""
    panel = case2_panel(na, nb, nc)
    target = [0] * len(panel.pairs)
    for x, y, s in removed:
        cov = panel.covvec(x, y)
        for p in range(len(target)):
            target[p] += s * cov[p]
    return _solve(panel, ("c2", na, nb, nc), tuple(target), len(removed))
