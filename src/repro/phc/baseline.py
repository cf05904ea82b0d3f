"""iPHC-Query — the baseline algorithm (paper §2.3.2, Algorithm 1).

For each anchored start time ``ts``, the end time ``te`` sweeps *up*
from ``ts`` to ``Te`` and the temporal k-core grows incrementally:

* a min-heap ``H_v`` over PHC-Index core times releases vertices into
  the core vertex set ``V`` as soon as ``core_time <= te``;
* a min-heap ``H_e`` over edge timestamps releases window edges; an
  edge joins ``E`` only when both endpoints are already in ``V``,
  otherwise it is pushed back for re-examination at a later ``te``
  (the push-back churn is the baseline's intrinsic inefficiency the
  paper contrasts with TCD's delete-once behaviour).

A core ``(V, E)`` is collected when non-empty and not identical to a
previously collected result (edge-set identity).
"""
from __future__ import annotations

import heapq
from typing import Sequence

from ..core.records import CoreRecord, QueryResult, QueryStats
from .index import PHCIndex

Edge = tuple[int, int, int]


def iphc_query(
    edges: Sequence[Edge],
    index: PHCIndex,
    k: int,
    Ts: int,
    Te: int,
    *,
    materialize: bool = False,
) -> QueryResult:
    """Answer TCQ(G, k, [Ts, Te]) incrementally using a PHC-Index.

    ``edges`` is the full temporal edge list with ids = positions, so
    signatures are comparable with the TEL-based algorithms. The index
    must cover anchors ``Ts..Te`` at this ``k`` (see ``build_phc_index``).
    """
    span = Te - Ts + 1
    res = QueryResult(stats=QueryStats(cells_total=span * (span + 1) // 2))
    seen: set[frozenset[int]] = set()
    window = [
        (t, e, u, v)
        for e, (u, v, t) in enumerate(edges)
        if Ts <= t <= Te
    ]

    for ts in range(Ts, Te + 1):
        hv = [(ct, v) for v, ct in index.get(ts, {}).items()]
        heapq.heapify(hv)
        he = [(t, e, u, v) for (t, e, u, v) in window if t >= ts]
        heapq.heapify(he)
        V: set[int] = set()
        E: set[int] = set()
        t_min = t_max = None  # running TTI of (V, E)
        for te in range(ts, Te + 1):
            res.stats.cells_evaluated += 1
            changed = False
            while hv and hv[0][0] <= te:
                _, v = heapq.heappop(hv)
                V.add(v)
                changed = True
            pushback = []
            while he and he[0][0] <= te:
                item = heapq.heappop(he)
                t, e, u, v = item
                if u in V and v in V:
                    E.add(e)
                    changed = True
                    t_min = t if t_min is None else min(t_min, t)
                    t_max = t if t_max is None else max(t_max, t)
                else:
                    pushback.append(item)
            for item in pushback:
                heapq.heappush(he, item)
            if not changed or not V or not E:
                continue
            sig = frozenset(E)
            if sig in seen:
                continue
            seen.add(sig)
            res.cores.append(
                CoreRecord(
                    ts=ts,
                    te=te,
                    tti=(t_min, t_max),
                    n_vertices=len(V),
                    n_edges=len(E),
                    signature=sig,
                    edges=tuple(sorted(edges[e] for e in E))
                    if materialize
                    else None,
                )
            )
    res.stats.cores_collected = len(res.cores)
    return res
