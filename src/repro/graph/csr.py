"""CSR data graph + the paper's preprocessing passes (SS4.2, SS7.2).

``CSRGraph`` is the broadcast-friendly substrate every engine searches over:
plain numpy arrays (indptr/indices), neighbor lists sorted ascending (the
paper sorts them to enable early exit / bounded search), plus the input
information G2Miner's loader extracts (|V|, |E|, max degree Delta, label
frequencies).

Preprocessing ports:

- ``orient``      — *orientation* (opt A): convert the undirected graph into
                    a DAG by (degree, id) order; halves the edges, shrinks
                    Delta, removes on-the-fly symmetry checks for cliques.
- ``rename_by_degree`` — sorting/renaming vertices (SS4.2 / SS8.4).
- ``reduced_edge_tasks`` — *edgelist reduction* (opt J): when the symmetry
                    order includes v0 > v1, keep one instance per
                    undirected edge.
- ``local_graph`` — *local graph search* substrate (opt E): the induced
                    adjacency among a root's neighbors, renamed to
                    0..d-1, as a dense bitmap (opt F).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class CSRGraph:
    """Immutable CSR representation of a data graph.

    ``indptr``/``indices`` follow the usual CSR convention; every neighbor
    list ``indices[indptr[v]:indptr[v+1]]`` is sorted ascending. For an
    undirected graph the structure is symmetric; after ``orient`` it holds
    only the DAG out-edges.
    """

    indptr: np.ndarray
    indices: np.ndarray
    labels: np.ndarray | None = None
    directed: bool = False
    #: Ranking used by orientation, kept so tests can validate acyclicity.
    orient_rank: np.ndarray | None = None

    # -- input information (paper: "extracts input information") ---------
    @property
    def n(self) -> int:
        return len(self.indptr) - 1

    @property
    def num_edges_stored(self) -> int:
        """Stored (directed) edge count: 2|E| symmetric, |E| oriented."""
        return len(self.indices)

    @property
    def num_edges(self) -> int:
        """Undirected edge count |E|."""
        return len(self.indices) if self.directed else len(self.indices) // 2

    @property
    def degrees(self) -> np.ndarray:
        return np.diff(self.indptr)

    @property
    def max_degree(self) -> int:
        return int(self.degrees.max(initial=0))

    def neighbors(self, v: int) -> np.ndarray:
        return self.indices[self.indptr[v] : self.indptr[v + 1]]

    def label_frequency(self) -> dict[int, int]:
        """Vertex frequency of each label (used by FSM opt N)."""
        if self.labels is None:
            return {}
        vals, cnt = np.unique(self.labels, return_counts=True)
        return dict(zip(vals.tolist(), cnt.tolist()))

    def has_edge(self, u: int, v: int) -> bool:
        nb = self.neighbors(u)
        i = np.searchsorted(nb, v)
        return i < len(nb) and nb[i] == v

    def nbytes(self) -> int:
        """Bytes of the CSR structure — input to the device-memory model."""
        lb = self.labels.nbytes if self.labels is not None else 0
        return int(self.indptr.nbytes + self.indices.nbytes + lb)

    # -- preprocessing ---------------------------------------------------

    def orient(self) -> "CSRGraph":
        """Orientation (opt A): keep edge u->v iff (deg(u),u) < (deg(v),v).

        Produces a DAG whose out-degree is bounded by the graph degeneracy
        neighborhood — the classic clique preprocessing. Must be called on
        the symmetric graph.
        """
        if self.directed:
            raise ValueError("orient() expects the symmetric graph")
        deg = self.degrees
        src = np.repeat(np.arange(self.n), deg)
        dst = self.indices
        rank = np.argsort(np.argsort(deg * (self.n + 1) + np.arange(self.n)))
        keep = rank[src] < rank[dst]
        return build_csr(
            np.stack([src[keep], dst[keep]], axis=1),
            n=self.n,
            labels=self.labels,
            directed=True,
            symmetrize=False,
            orient_rank=rank,
        )

    def rename_by_degree(self) -> "CSRGraph":
        """Renaming/sorting (SS4.2): relabel vertices by descending degree so
        hub vertices get small, contiguous ids (locality/load-balance)."""
        if self.directed:
            raise ValueError("rename before orientation")
        order = np.lexsort((np.arange(self.n), -self.degrees))
        new_id = np.empty(self.n, dtype=np.int64)
        new_id[order] = np.arange(self.n)
        deg = self.degrees
        src = new_id[np.repeat(np.arange(self.n), deg)]
        dst = new_id[self.indices]
        lab = self.labels[order] if self.labels is not None else None
        keep = src < dst
        return build_csr(
            np.stack([src[keep], dst[keep]], axis=1), n=self.n, labels=lab
        )

    def edge_tasks(self, mode: str = "all") -> np.ndarray:
        """The task edgelist Omega (SS7.1) as an ``(m, 2)`` array.

        ``mode`` applies edgelist reduction (opt J): ``"lt"`` keeps one
        instance per undirected edge with src < dst (valid when the
        symmetry order includes v0 < v1), ``"gt"`` the mirror, ``"all"``
        keeps both directions. On an oriented graph the DAG edges already
        are a reduced list, so ``mode`` is ignored.
        """
        deg = self.degrees
        src = np.repeat(np.arange(self.n), deg)
        dst = self.indices
        if mode not in ("all", "lt", "gt"):
            raise ValueError(f"bad mode {mode!r}")
        if mode != "all" and not self.directed:
            keep = src < dst if mode == "lt" else src > dst
            return np.stack([src[keep], dst[keep]], axis=1)
        return np.stack([src, dst], axis=1)

    def local_graph(self, root_nbrs: np.ndarray) -> np.ndarray:
        """Local graph construction (opt E+F): dense boolean adjacency among
        ``root_nbrs`` (renamed to 0..d-1), the Fig. 7 structure.

        Returned matrix ``A[i, j]`` says whether root_nbrs[i] and
        root_nbrs[j] are adjacent in G. Vertex degrees inside the local
        graph are <= those in G, which is why LGS search is faster.
        """
        d = len(root_nbrs)
        A = np.zeros((d, d), dtype=bool)
        for i, u in enumerate(root_nbrs):
            nb = self.neighbors(int(u))
            hit = np.searchsorted(root_nbrs, nb)
            ok = (hit < d) & (root_nbrs[np.minimum(hit, d - 1)] == nb)
            A[i, hit[ok]] = True
        return A


def build_csr(
    edges: np.ndarray,
    *,
    n: int | None = None,
    labels: np.ndarray | None = None,
    directed: bool = False,
    symmetrize: bool = True,
    orient_rank: np.ndarray | None = None,
) -> CSRGraph:
    """Build a CSR graph from an ``(m, 2)`` edge array.

    ``symmetrize=True`` (the graph-loader default) stores both directions of
    every undirected edge; neighbor lists come out sorted ascending, the
    invariant every set-op primitive relies on.
    """
    edges = np.asarray(edges, dtype=np.int64).reshape(-1, 2)
    if n is None:
        n = int(edges.max(initial=-1)) + 1
    if symmetrize and not directed:
        edges = np.concatenate([edges, edges[:, ::-1]])
    order = np.lexsort((edges[:, 1], edges[:, 0]))
    src, dst = edges[order, 0], edges[order, 1]
    indptr = np.zeros(n + 1, dtype=np.int64)
    np.add.at(indptr, src + 1, 1)
    np.cumsum(indptr, out=indptr)
    return CSRGraph(
        indptr=indptr,
        indices=np.ascontiguousarray(dst),
        labels=labels,
        directed=directed,
        orient_rank=orient_rank,
    )
