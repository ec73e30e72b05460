"""Independent-cascade (IC) model substrate.

Vectorized NumPy kernels over :class:`repro.graphs.csr.CSRGraph`:

* :mod:`repro.ic.forward` — batched forward Monte-Carlo diffusion (Oneshot).
* :mod:`repro.ic.live` — live-edge graph sampling + batched reachability
  (Snapshot).
* :mod:`repro.ic.rr` — batched reverse-reachable set generation (RIS).
* :mod:`repro.ic.exact` — exact influence by live-graph enumeration (tiny
  graphs; test oracle).
* :mod:`repro.ic.dataflow` — pure Spark DataFrame implementations of the
  same primitives (iterative-join BFS), cross-checked against the kernels.

All kernels count *traversal cost* with the paper's definitions (§3.2): the
vertex cost is the number of vertices scanned, the edge cost the number of
edges examined.
"""
import numpy as np


def gather_edges(indptr: np.ndarray, frontier: np.ndarray):
    """Flatten the adjacency ranges of ``frontier`` vertices.

    Returns ``(eidx, owner)`` where ``eidx`` are edge indices into the CSR
    arrays and ``owner[i]`` is the position in ``frontier`` owning edge i.
    """
    cnt = indptr[frontier + 1] - indptr[frontier]
    total = int(cnt.sum())
    if total == 0:
        e = np.empty(0, dtype=np.int64)
        return e, e
    offsets = np.arange(total, dtype=np.int64) - np.repeat(
        np.cumsum(cnt) - cnt, cnt
    )
    eidx = np.repeat(indptr[frontier], cnt) + offsets
    owner = np.repeat(np.arange(len(frontier), dtype=np.int64), cnt)
    return eidx, owner
