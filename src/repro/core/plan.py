"""The pattern analyzer (paper SS4.2): matching order, symmetry order, and
the per-level constraint sets that together form the *search plan*.

A ``SearchPlan`` is the intermediate representation the code generator
consumes (SS5): for each level i it records which earlier levels to
intersect with (pattern neighbors), which to difference against
(non-neighbors, for vertex-induced search), the symmetry-breaking bounds,
and which earlier vertices need an explicit identity exclusion.

Symmetry order uses the stabilizer-chain construction (the GraphZero
algorithm the paper adopts): walk positions in matching order; at each
position i, for every vertex j in i's orbit under the current automorphism
subgroup add the partial order v_i < v_j, then restrict the subgroup to the
stabilizer of i. This guarantees each automorphism class of matches has
exactly one representative satisfying the constraints — the completeness +
uniqueness requirement of SS2.1 (property-tested in tests/test_plan.py).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.pattern import Pattern


@dataclass(frozen=True)
class SearchPlan:
    """Executable search plan for one pattern, in *position space*: the
    pattern has been relabeled so position i is the i-th matched vertex.

    For each level ``i`` (0-based; levels 1..k-1 are extensions):

    - ``conn[i]``  — earlier positions adjacent in P: candidate set =
                     intersection of their data-neighborhoods.
    - ``anti[i]``  — earlier positions non-adjacent in P: subtracted when
                     searching vertex-induced matches.
    - ``upper[i]`` / ``lower[i]`` — symmetry bounds: v_i < v_j / v_i > v_j.
    - ``excl[i]``  — earlier positions whose data vertex must merely be
                     *different* (identity exclusion not already implied by
                     a strict bound).
    """

    pattern: Pattern  # relabeled into position space
    order: tuple[int, ...]  # position -> original pattern vertex id
    sym: tuple[tuple[int, int], ...]  # (i, j) meaning v_i < v_j
    conn: tuple[tuple[int, ...], ...]
    anti: tuple[tuple[int, ...], ...]
    upper: tuple[tuple[int, ...], ...]
    lower: tuple[tuple[int, ...], ...]
    excl: tuple[tuple[int, ...], ...]
    induced: bool

    @property
    def k(self) -> int:
        return self.pattern.k

    @property
    def num_automorphisms(self) -> int:
        return len(self.pattern.automorphisms())

    def edge_parallel_ok(self) -> bool:
        """Edge parallelism needs the first two positions to be a pattern
        edge (they always are for a connected matching order)."""
        return self.pattern.has_edge(0, 1)

    def first_edge_reduced(self) -> bool:
        """True iff the symmetry order constrains v0 vs v1 — enabling
        edgelist reduction (opt J, SS7.2(2))."""
        return (0, 1) in self.sym or (1, 0) in self.sym

    def num_buffers(self) -> int:
        """Adaptive-buffering input (opt K): number of per-warp buffers X.

        A level needs a buffer when its candidate set is *computed* (>= 2
        operand sets) and reused by deeper levels; the paper bounds this by
        k - 3 (first two levels and the leaf need none).
        """
        x = 0
        for i in range(2, self.k - 1):
            if len(self.conn[i]) + (len(self.anti[i]) if self.induced else 0) >= 1:
                x += 1
        return min(x, max(self.k - 3, 0))


def matching_order(p: Pattern) -> tuple[int, ...]:
    """Pick a matching order with the connectivity-greedy cost heuristic:
    start at a max-degree vertex, then repeatedly add the vertex with the
    most connections into the partial subgraph (ties: higher pattern
    degree, then lower id). This reproduces the orders the paper shows
    (e.g. diamond: hub, hub, apex, apex) and guarantees every level
    extends by a connected vertex.
    """
    if not p.is_connected():
        raise ValueError("matching order requires a connected pattern")
    remaining = set(range(p.k))
    first = max(remaining, key=lambda u: (p.degree(u), -u))
    order = [first]
    remaining.remove(first)
    while remaining:
        nxt = max(
            remaining,
            key=lambda u: (
                sum(1 for v in order if p.has_edge(u, v)),
                p.degree(u),
                -u,
            ),
        )
        order.append(nxt)
        remaining.remove(nxt)
    return tuple(order)


def symmetry_order(p_pos: Pattern) -> tuple[tuple[int, int], ...]:
    """Stabilizer-chain symmetry breaking on the *position-space* pattern.

    Returns constraints ``(i, j)`` meaning data vertex at position i must be
    < the one at position j.
    """
    auts = p_pos.automorphisms()
    cons: list[tuple[int, int]] = []
    for i in range(p_pos.k):
        if len(auts) == 1:
            break
        orbit = {phi[i] for phi in auts}
        for j in sorted(orbit - {i}):
            cons.append((i, j))
        auts = [phi for phi in auts if phi[i] == i]
    return tuple(cons)


def build_plan(p: Pattern, *, induced: bool) -> SearchPlan:
    """Full pattern analysis: matching order -> relabel to position space ->
    symmetry order -> per-level constraint sets."""
    order = matching_order(p)
    # perm[original vertex] = position
    perm = [0] * p.k
    for pos, v in enumerate(order):
        perm[v] = pos
    p_pos = p.relabel(tuple(perm))
    sym = symmetry_order(p_pos)

    conn, anti, upper, lower, excl = [], [], [], [], []
    for i in range(p.k):
        c = tuple(j for j in range(i) if p_pos.has_edge(i, j))
        a = tuple(j for j in range(i) if not p_pos.has_edge(i, j))
        up = tuple(j for (ii, j) in sym if ii == i and j < i)
        lo = tuple(j2 for (j2, ii) in sym if ii == i and j2 < i)
        bounded = set(up) | set(lo)
        ex = tuple(j for j in a if j not in bounded)
        conn.append(c)
        anti.append(a)
        upper.append(up)
        lower.append(lo)
        excl.append(ex)
        if i >= 1 and not c:
            raise AssertionError("disconnected matching order")
    return SearchPlan(
        pattern=p_pos,
        order=order,
        sym=sym,
        conn=tuple(conn),
        anti=tuple(anti),
        upper=tuple(upper),
        lower=tuple(lower),
        excl=tuple(excl),
        induced=induced,
    )
