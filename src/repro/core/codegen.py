"""Pattern-specific code generation (paper SS5).

G2Miner's code generator turns a search plan into pattern-specific CUDA
kernels. This port generates two artifacts from the same ``SearchPlan``:

1. **DFS kernels** — Python source for the nested-loop search program
   (Algorithm 1 shape: one loop per level, set-op calls against the
   primitive library, symmetry-breaking bounds, leaf counted with ``len``),
   compiled with ``exec``. One kernel per (pattern, parallelism mode),
   exactly like one CUDA kernel per pattern. The generated source is kept
   on the function object (``kernel.__source__``) for inspection/tests.

2. **Pattern SQL** — a join-chain query over a symmetric adjacency table
   ``adj(src, dst)`` with NOT EXISTS anti-edges and symmetry predicates.
   The same text runs on Spark Catalyst (the BFS engines build the
   equivalent DataFrame chain) and on DuckDB (the correctness oracle), so
   every engine result is checked against an independently generated and
   independently executed query.
"""
from __future__ import annotations

from repro.core.plan import SearchPlan


def _level_body(plan: SearchPlan, i: int, lines: list[str], ind: str,
                needed_nbrs: set[int], guard_first: bool) -> None:
    """Emit code computing candidate set ``S{i}`` and the loop/leaf for
    level ``i`` (recursive over levels)."""
    k = plan.k
    conn = plan.conn[i]
    ops_needed = (
        len(conn) - 1
        + (len(plan.anti[i]) if plan.induced else 0)
        + len(plan.upper[i])
        + len(plan.lower[i])
        + (1 if plan.excl[i] else 0)
    )
    first = conn[0]
    if ops_needed == 0:
        lines.append(f"{ind}S{i} = N{first}")
    else:
        cur = f"N{first}"
        for j in conn[1:]:
            lines.append(f"{ind}S{i} = ops.intersect({cur}, N{j}, ctr)")
            cur = f"S{i}"
        if plan.induced:
            for j in plan.anti[i]:
                lines.append(f"{ind}S{i} = ops.difference({cur}, N{j}, ctr)")
                cur = f"S{i}"
        for j in plan.upper[i]:
            lines.append(f"{ind}S{i} = ops.bound_upper({cur}, v{j}, ctr)")
            cur = f"S{i}"
        for j in plan.lower[i]:
            lines.append(f"{ind}S{i} = ops.bound_lower({cur}, v{j}, ctr)")
            cur = f"S{i}"
        if plan.excl[i]:
            vals = ", ".join(f"v{j}" for j in plan.excl[i]) + ","
            lines.append(f"{ind}S{i} = ops.remove({cur}, ({vals}), ctr)")
    if i == k - 1:
        # Leaf: the candidate set *is* the matches; count with len (the
        # paper's counting-at-the-leaf, valid for listing timings too
        # since S{i} is materialised).
        lines.append(f"{ind}total += len(S{i})")
        return
    lines.append(f"{ind}for v{i} in S{i}:")
    ind2 = ind + "    "
    if i in needed_nbrs:
        lines.append(f"{ind2}N{i} = indices[indptr[v{i}]:indptr[v{i}+1]]")
    _level_body(plan, i + 1, lines, ind2, needed_nbrs, guard_first)


def kernel_source(plan: SearchPlan, mode: str, *, assume_reduced: bool = True) -> str:
    """Generate the DFS kernel source for ``plan``.

    ``mode='edge'``: the task is an edge (v0, v1) — G2Miner's default
    edge parallelism (SS5.1(2)). ``mode='vertex'``: the task is a root
    vertex v0 and the kernel owns the v1 loop — the CPU-system default.
    ``assume_reduced`` says the task edgelist already satisfies the v0/v1
    symmetry bound (opt J), so no guard is generated.
    """
    k = plan.k
    needed = {j for i in range(2, k) for j in plan.conn[i]}
    if plan.induced:
        needed |= {j for i in range(2, k) for j in plan.anti[i]}
    lines: list[str] = []
    if mode == "edge":
        lines.append("def kernel(v0, v1, indptr, indices, ops, ctr):")
        lines.append("    total = 0")
        if not assume_reduced:
            for j in plan.upper[1]:
                lines.append(f"    if v1 >= v{j}: return 0")
            for j in plan.lower[1]:
                lines.append(f"    if v1 <= v{j}: return 0")
        for j in sorted(needed & {0, 1}):
            lines.append(f"    N{j} = indices[indptr[v{j}]:indptr[v{j}+1]]")
        if k == 2:
            lines.append("    total += 1")
        else:
            _level_body(plan, 2, lines, "    ", needed, False)
    elif mode == "vertex":
        lines.append("def kernel(v0, indptr, indices, ops, ctr):")
        lines.append("    total = 0")
        lines.append("    N0 = indices[indptr[v0]:indptr[v0+1]]")
        # Level 1: candidates from N0 plus bounds vs v0.
        cur = "N0"
        for j in plan.upper[1]:
            lines.append(f"    S1 = ops.bound_upper({cur}, v{j}, ctr)")
            cur = "S1"
        for j in plan.lower[1]:
            lines.append(f"    S1 = ops.bound_lower({cur}, v{j}, ctr)")
            cur = "S1"
        if k == 2:
            lines.append(f"    total += len({cur})")
        else:
            lines.append(f"    for v1 in {cur}:")
            if 1 in needed:
                lines.append("        N1 = indices[indptr[v1]:indptr[v1+1]]")
            _level_body(plan, 2, lines, "        ", needed, False)
    else:
        raise ValueError(f"bad mode {mode!r}")
    lines.append("    return total")
    return "\n".join(lines) + "\n"


def compile_kernel(plan: SearchPlan, mode: str, *, assume_reduced: bool = True):
    """Compile the generated source into a callable; the NVCC step."""
    src = kernel_source(plan, mode, assume_reduced=assume_reduced)
    ns: dict = {}
    exec(compile(src, f"<kernel:{plan.pattern.name or 'pattern'}:{mode}>", "exec"), ns)
    fn = ns["kernel"]
    fn.__source__ = src
    return fn


# -- SQL generation ------------------------------------------------------

def pattern_sql(plan: SearchPlan, *, adj: str = "adj", limit_level: int | None = None) -> str:
    """Generate the counting SQL for ``plan`` over a symmetric adjacency
    table ``adj(src, dst)``.

    The query introduces data vertices in matching order: v0, v1 come from
    the first adjacency row; each later level joins one adjacency row per
    pattern edge, adds NOT EXISTS per anti-edge (vertex-induced only),
    and symmetry/exclusion predicates. Returns one row ``cnt``.
    """
    k = plan.k if limit_level is None else limit_level
    if k < 2:
        raise ValueError("need k >= 2")
    v = {0: "e1.src", 1: "e1.dst"}
    joins = [f"{adj} e1"]
    preds: list[str] = []
    for i in range(2, k):
        conn = plan.conn[i]
        a0 = f"e{i}_{conn[0]}"
        joins.append(f"{adj} {a0}")
        preds.append(f"{a0}.src = {v[conn[0]]}")
        v[i] = f"{a0}.dst"
        for j in conn[1:]:
            al = f"e{i}_{j}"
            joins.append(f"{adj} {al}")
            preds.append(f"{al}.src = {v[j]}")
            preds.append(f"{al}.dst = {v[i]}")
        if plan.induced:
            for j in plan.anti[i]:
                preds.append(
                    f"NOT EXISTS (SELECT 1 FROM {adj} x{i}_{j} "
                    f"WHERE x{i}_{j}.src = {v[j]} AND x{i}_{j}.dst = {v[i]})"
                )
        for j in plan.excl[i]:
            preds.append(f"{v[i]} <> {v[j]}")
    for (i, j) in plan.sym:
        if i < k and j < k:
            preds.append(f"{v[i]} < {v[j]}")
    where = ("\nWHERE " + "\n  AND ".join(preds)) if preds else ""
    return (
        "SELECT COUNT(*) AS cnt\nFROM "
        + ",\n     ".join(joins)
        + where
    )
