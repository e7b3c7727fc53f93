"""The G2Miner execution engine: DFS search on Spark (paper SS5-SS7).

Execution model (the warp-centric two-level parallelism of SS5.1, ported to
the Spark dataflow model):

- *Tasks* are edges (G2Miner default) or root vertices (CPU systems): a
  numpy task array turned into a Spark DataFrame, pre-permuted with the
  chunked round-robin order (SS7.1 policy 3) so contiguous Spark partitions
  receive balanced work.
- Each partition executes the pattern's *generated kernel* (codegen.py)
  task-by-task via ``mapInPandas`` against a broadcast CSR — one Spark
  task = one "GPU", one data-graph task = one "warp", and the vectorised
  numpy set ops inside the kernel are the intra-warp data parallelism.
- Cliques get the special paths of the paper: orientation (opt A),
  DAG-edge tasks, and local-graph search with the dense bitmap format
  (opts E+F) guarded by the input-aware Delta threshold.

The engine accounts all materialised state against a device-memory budget
(``repro.memory``) and can report per-task measured work for the multi-GPU
scheduling simulation.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro import memory as memmod
from repro.core import codegen
from repro.core.pattern import Pattern, clique
from repro.core.plan import SearchPlan, build_plan
from repro.core.setops import BACKENDS, Counter
from repro.graph.csr import CSRGraph
from repro.sched.policies import chunked_round_robin_order


@dataclass
class DFSConfig:
    """Engine configuration — the knobs Table 2's optimizations hang off.

    The system facades in ``repro/systems/`` are specific settings of this.
    """

    parallelism: str = "edge"  # 'edge' (G2Miner) | 'vertex' (CPU systems)
    setops: str = "numpy"  # 'numpy' (SIMD/warp analog) | 'python' (scalar)
    orientation: bool = True  # opt A, cliques
    lgs: bool = True  # opts E+F, cliques
    edgelist_reduction: bool = True  # opt J
    num_partitions: int = 16
    memory_budget: int = memmod.GPU_MEM_BYTES
    lgs_delta_threshold: int = 4096  # input-aware LGS guard (SS5.4(2))
    chunked_schedule: bool = True  # opt G analog for partition balance


def oriented_clique_plan(k: int) -> SearchPlan:
    """Search plan for a k-clique on the *oriented* graph: every level
    intersects all earlier out-neighborhoods; the DAG replaces all
    symmetry bounds and on-the-fly checks (opt A's payoff)."""
    p = clique(k)
    empt = tuple(() for _ in range(k))
    return SearchPlan(
        pattern=p,
        order=tuple(range(k)),
        sym=(),
        conn=tuple(tuple(range(i)) for i in range(k)),
        anti=empt,
        upper=empt,
        lower=empt,
        excl=empt,
        induced=False,
    )


def _local_clique_count(A: np.ndarray, s: int) -> int:
    """Count s-cliques in a local DAG adjacency matrix (bitmap format).

    ``A[i, j]`` = oriented edge between local vertices i, j, so each clique
    is generated exactly once in DAG order; the leaf is a popcount — the
    ``__popc`` analog of SS6.1.
    """
    if s <= 0:
        return 1 if s == 0 else 0
    if s == 1:
        return A.shape[0]

    def rec(mask: np.ndarray, depth: int) -> int:
        if depth == 1:
            return int(mask.sum())
        t = 0
        for i in np.nonzero(mask)[0]:
            m2 = mask & A[i]
            if m2.any():
                t += rec(m2, depth - 1)
        return t

    return rec(np.ones(A.shape[0], dtype=bool), s)


# -- mapInPandas workers (module-level for clean pickling) ---------------

def _make_edge_worker(bc, kernel_src: str, backend: str):
    def worker(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        indptr, indices = bc.value
        ns: dict = {}
        exec(compile(kernel_src, "<kernel>", "exec"), ns)
        kernel = ns["kernel"]
        ops = BACKENDS[backend]
        ctr = Counter()
        total = 0
        for pdf in batches:
            for v0, v1 in zip(pdf["v0"].values, pdf["v1"].values):
                total += kernel(int(v0), int(v1), indptr, indices, ops, ctr)
        yield pd.DataFrame({"cnt": [total], "ops": [ctr.ops]})

    return worker


def _make_vertex_worker(bc, kernel_src: str, backend: str):
    def worker(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        indptr, indices = bc.value
        ns: dict = {}
        exec(compile(kernel_src, "<kernel>", "exec"), ns)
        kernel = ns["kernel"]
        ops = BACKENDS[backend]
        ctr = Counter()
        total = 0
        for pdf in batches:
            for v0 in pdf["v0"].values:
                total += kernel(int(v0), indptr, indices, ops, ctr)
        yield pd.DataFrame({"cnt": [total], "ops": [ctr.ops]})

    return worker


def _make_lgs_worker(bc, k: int):
    """Local-graph-search clique worker (opts E+F): per root vertex, build
    the induced local DAG among its out-neighbors as a dense bitmap and
    count (k-1)-cliques inside it."""

    def worker(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        indptr, indices = bc.value
        total = 0
        touched = 0
        for pdf in batches:
            for v0 in pdf["v0"].values:
                v0 = int(v0)
                L = indices[indptr[v0] : indptr[v0 + 1]]
                d = len(L)
                if d < k - 1:
                    continue
                A = np.zeros((d, d), dtype=bool)
                for i in range(d):
                    nb = indices[indptr[L[i]] : indptr[L[i] + 1]]
                    hit = np.searchsorted(L, nb)
                    hit[hit == d] = d - 1
                    ok = L[hit] == nb
                    A[i, hit[ok]] = True
                touched += d * d
                total += _local_clique_count(A, k - 1)
        yield pd.DataFrame({"cnt": [total], "ops": [touched]})

    return worker


def _count_df(spark: SparkSession, tasks: np.ndarray, worker, n_parts: int):
    """Run ``worker`` over the task array and sum (cnt, ops).

    ``createDataFrame`` slices the (already schedule-permuted) task array
    into ~defaultParallelism contiguous Arrow batches — that slicing IS
    the task-to-device assignment, so no extra shuffle is issued.
    """
    cols = ["v0"] if tasks.ndim == 1 else ["v0", "v1"]
    pdf = pd.DataFrame(tasks.reshape(len(tasks), -1), columns=cols)
    out = spark.createDataFrame(pdf).mapInPandas(worker, schema="cnt long, ops long")
    rows = out.groupBy().sum("cnt", "ops").collect()[0]
    return int(rows[0] or 0), int(rows[1] or 0)


class DFSEngine:
    """Pattern counting/listing via generated DFS kernels on Spark."""

    def __init__(self, config: DFSConfig | None = None):
        self.cfg = config or DFSConfig()
        self.last_ops = 0  # measured set-op work of the last run

    # -- public API (the count()/list() of Listing 1) --------------------

    def count(
        self,
        spark: SparkSession,
        csr: CSRGraph,
        pattern: Pattern,
        *,
        induced: bool = False,
        meter: memmod.MemoryMeter | None = None,
    ) -> int:
        """Count matches of ``pattern`` in the data graph.

        ``induced=True`` counts vertex-induced matches (k-MC semantics),
        else edge-induced/monomorphism matches up to automorphism
        (TC/k-CL/SL semantics).
        """
        meter = meter or memmod.MemoryMeter(self.cfg.memory_budget)
        cfg = self.cfg
        # For cliques, vertex- and edge-induced matches coincide (SS2.1),
        # so orientation applies regardless of the induced flag.
        use_orient = pattern.is_clique() and cfg.orientation
        g = csr.orient() if use_orient else csr
        meter.alloc("csr", g.nbytes())
        bc = spark.sparkContext.broadcast((g.indptr, g.indices))
        try:
            if (
                use_orient
                and cfg.lgs
                and pattern.k >= 4
                and g.max_degree <= cfg.lgs_delta_threshold
            ):
                tasks = self._schedule(np.arange(g.n, dtype=np.int64))
                meter.alloc("tasks", tasks.nbytes)
                worker = _make_lgs_worker(bc, pattern.k)
                cnt, ops = _count_df(spark, tasks, worker, cfg.num_partitions)
                self.last_ops = ops
                return cnt

            plan = (
                oriented_clique_plan(pattern.k)
                if use_orient
                else build_plan(pattern, induced=induced)
            )
            use_edge = cfg.parallelism == "edge" and plan.edge_parallel_ok()
            if use_edge:
                # Input-aware Omega management (SS5.1 + SS7.2): when the
                # symmetry order does not cover (v0, v1) the edgelist
                # cannot be reduced, and a full Omega may not fit the
                # device budget next to G. The paper's escape hatch is the
                # vertex-parallel mode, "in which case Omega is not
                # generated to save memory" — take it automatically.
                probe, _ = self._edge_tasks(g, plan)
                if meter.resident + probe.nbytes > meter.budget:
                    use_edge = False
            if use_edge:
                tasks, reduced = self._edge_tasks(g, plan)
                kernel_src = codegen.kernel_source(
                    plan, "edge", assume_reduced=reduced
                )
                # Adaptive buffering (opt K): X buffers of Delta words per
                # concurrent warp (= partition here).
                meter.alloc("tasks", tasks.nbytes)
                meter.alloc(
                    "buffers",
                    plan.num_buffers() * g.max_degree * 8 * cfg.num_partitions,
                )
                tasks = self._schedule(tasks)
                worker = _make_edge_worker(bc, kernel_src, cfg.setops)
            else:
                tasks = np.arange(g.n, dtype=np.int64)
                kernel_src = codegen.kernel_source(plan, "vertex")
                meter.alloc("tasks", tasks.nbytes)
                meter.alloc(
                    "buffers",
                    plan.num_buffers() * g.max_degree * 8 * cfg.num_partitions,
                )
                tasks = self._schedule(tasks)
                worker = _make_vertex_worker(bc, kernel_src, cfg.setops)
            cnt, ops = _count_df(spark, tasks, worker, cfg.num_partitions)
            self.last_ops = ops
            return cnt
        finally:
            bc.unpersist()
            meter.free("csr")
            meter.free("tasks")
            meter.free("buffers")

    def count_df(self, spark: SparkSession, csr: CSRGraph, pattern: Pattern, **kw):
        """Count wrapped as a one-row DataFrame (column ``cnt``) so results
        flow through ``repro.oracle.assert_equivalent``."""
        c = self.count(spark, csr, pattern, **kw)
        return spark.createDataFrame(pd.DataFrame({"cnt": [c]}))

    # -- internals -------------------------------------------------------

    def _edge_tasks(self, g: CSRGraph, plan: SearchPlan) -> tuple[np.ndarray, bool]:
        """Task edgelist Omega with edgelist reduction (opt J) when the
        symmetry order covers (v0, v1). Returns (tasks, reduced?)."""
        if g.directed:
            return g.edge_tasks("all"), True
        if self.cfg.edgelist_reduction:
            if (0, 1) in plan.sym:
                return g.edge_tasks("lt"), True
            if (1, 0) in plan.sym:
                return g.edge_tasks("gt"), True
        return g.edge_tasks("all"), False

    def _schedule(self, tasks: np.ndarray) -> np.ndarray:
        """Apply the chunked round-robin permutation (SS7.1 policy 3) so
        contiguous partitions get interleaved (balanced) work."""
        if not self.cfg.chunked_schedule or len(tasks) == 0:
            return tasks
        perm = chunked_round_robin_order(
            len(tasks), self.cfg.num_partitions, chunk=32
        )
        return tasks[perm]

    def per_task_costs(
        self, spark: SparkSession, csr: CSRGraph, pattern: Pattern, *, induced: bool = False
    ) -> np.ndarray:
        """Measured per-edge-task work (set-op element touches) — the input
        the multi-GPU scheduling simulation uses (Fig 9/10 substance)."""
        plan = build_plan(pattern, induced=induced)
        kernel = codegen.compile_kernel(plan, "edge", assume_reduced=True)
        tasks, _ = self._edge_tasks(csr, plan)
        ops = BACKENDS["numpy"]
        costs = np.zeros(len(tasks), dtype=np.int64)
        indptr, indices = csr.indptr, csr.indices
        for t in range(len(tasks)):
            ctr = Counter()
            kernel(int(tasks[t, 0]), int(tasks[t, 1]), indptr, indices, ops, ctr)
            costs[t] = ctr.ops + 1
        return costs
