"""Random-walk execution engines.

Four engines share one stochastic process (same counter RNG, same sampler
draw schedule → bitwise-identical walks) and differ only in execution
strategy — which is the paper's entire subject:

* :func:`run_sequential` — Algorithm 2 one query at a time, scalar steps.
  This is the per-thread inner loop of BL/HG, i.e. ThunderRW *wo/si*.
* :func:`run_interleaved` — Algorithm 4: a ring of ≤ k in-flight walkers
  stepped together, Gather/Move/Update vectorized across the ring. This is
  the step-interleaving analogue (*w/si*): the long-latency per-step cost
  (DRAM miss in the paper, interpreter dispatch + cache miss here) is
  amortized over the whole ring instead of paid per walker.
* :func:`run_bsp` — KnightKing's model: supersteps that move one step for
  every active query, each query a scalar task (tail problem included).
* :func:`run_asp` — GraphWalker's model: vertex-range partitions, a query
  runs while it stays inside the loaded partition, the scheduler loads the
  partition with the most parked queries (swap count reported).

The per-step timing hooks (``timers``) feed Table 2's compute-p(e)/Init/
Gen breakdown.
"""
from __future__ import annotations

import time
from typing import Callable

import numpy as np

from repro.core.model import RandomWalkApp, WalkerType
from repro.core.walker import WalkOutput, _OutBuffer
from repro.graph.csr import CSRGraph
from repro.sampling import alias as alias_m
from repro.sampling import its as its_m
from repro.sampling import naive as naive_m
from repro.sampling import orej as orej_m
from repro.sampling import preprocess
from repro.sampling import rej as rej_m
from repro.sampling.base import flatten_segments

ENGINES = ("sequential", "interleaved", "bsp", "asp")


def _static_tables(csr: CSRGraph, app: RandomWalkApp) -> dict:
    """Algorithm 3 preprocessing for unbiased/static apps ({} for dynamic)."""
    if app.walker_type is WalkerType.DYNAMIC or app.sampler == "orej":
        # O-REJ skips preprocessing entirely (§4.2); dynamic has none.
        if app.sampler in ("rej", "orej") and app.walker_type is not WalkerType.DYNAMIC:
            # REJ/O-REJ generation probes raw transition weights.
            return {"weights": preprocess.static_weights(csr, app.table_kind())}
        return {}
    if app.sampler == "naive":
        return {}
    return preprocess.build(csr, app.sampler, app.table_kind())


def _orej_pstar(app: RandomWalkApp, csr: CSRGraph) -> float:
    """User MaxWeight for O-REJ; a loose static default when not given."""
    if app.max_weight is not None:
        return float(app.max_weight)
    if app.walker_type is WalkerType.UNBIASED:
        return 1.0
    return float(csr.weight.max()) if csr.num_edges else 1.0


# ---------------------------------------------------------------------------
# Scalar stepper — shared by sequential / BSP / ASP so all three walk
# identically.
# ---------------------------------------------------------------------------

def _make_scalar_stepper(
    csr: CSRGraph, app: RandomWalkApp, seed: int, timers: dict | None = None
) -> Callable[[int, int, int, int], int]:
    """Return ``step(qid, cur, prev, length) -> next_vertex`` (-1 = stop)."""
    indptr, dst = csr.indptr, csr.dst
    sampler = app.sampler
    dynamic = app.walker_type is WalkerType.DYNAMIC
    tab = _static_tables(csr, app)
    pstar = _orej_pstar(app, csr) if sampler == "orej" else None
    clock = time.perf_counter if timers is not None else None

    def step(qid: int, cur: int, prev: int, length: int) -> int:
        s, e = int(indptr[cur]), int(indptr[cur + 1])
        d = e - s
        if d == 0:
            return -1
        if dynamic and sampler != "orej":
            # Gather: apply the Weight UDF to E_cur.
            t0 = clock() if clock else 0.0
            flat = np.arange(s, e, dtype=np.int64)
            w = app.weight_fn(
                csr, flat, np.full(d, prev, dtype=np.int64), np.full(d, length, dtype=np.int64)
            )
            t1 = clock() if clock else 0.0
            if sampler == "its":
                cum = its_m.init(w)
                t2 = clock() if clock else 0.0
                x = its_m.generate_scalar(cum, seed, qid, length)
            elif sampler == "alias":
                if float(w.sum()) <= 0.0:
                    return -1
                tables = alias_m.init(w)
                t2 = clock() if clock else 0.0
                x = alias_m.generate_scalar(tables, seed, qid, length)
            elif sampler == "rej":
                pm = rej_m.init(w)
                t2 = clock() if clock else 0.0
                x = rej_m.generate_scalar(w, pm, seed, qid, length)
            else:
                raise ValueError(f"sampler {sampler!r} unsupported for dynamic RW")
            if timers is not None:
                t3 = time.perf_counter()
                timers["weight"] = timers.get("weight", 0.0) + (t1 - t0)
                timers["init"] = timers.get("init", 0.0) + (t2 - t1)
                timers["gen"] = timers.get("gen", 0.0) + (t3 - t2)
        elif sampler == "orej":
            def probe(flat_idx: np.ndarray, rows: np.ndarray) -> np.ndarray:
                if dynamic:
                    return app.weight_fn(
                        csr,
                        flat_idx,
                        np.full(len(flat_idx), prev, dtype=np.int64),
                        np.full(len(flat_idx), length, dtype=np.int64),
                    )
                return tab["weights"][flat_idx]

            t1 = clock() if clock else 0.0
            x = orej_m.generate_scalar(d, s, pstar, probe, seed, qid, length)
            if timers is not None:
                timers["gen"] = timers.get("gen", 0.0) + (time.perf_counter() - t1)
        else:
            t1 = clock() if clock else 0.0
            if sampler == "naive":
                x = naive_m.generate_scalar(d, seed, qid, length)
            elif sampler == "its":
                x = its_m.generate_scalar(tab["cum"][s:e], seed, qid, length)
            elif sampler == "alias":
                x = alias_m.generate_scalar(
                    (tab["prob"][s:e], tab["a1"][s:e], tab["a2"][s:e]), seed, qid, length
                )
            elif sampler == "rej":
                x = rej_m.generate_scalar(
                    tab["weights"][s:e], float(tab["pmax"][cur]), seed, qid, length
                )
            else:
                raise ValueError(f"unknown sampler {sampler!r}")
            if timers is not None:
                timers["gen"] = timers.get("gen", 0.0) + (time.perf_counter() - t1)
        if x < 0:
            return -1
        return int(dst[s + x])

    return step


def run_sequential(
    csr: CSRGraph,
    app: RandomWalkApp,
    sources: np.ndarray,
    qids: np.ndarray | None = None,
    seed: int = 0,
    timers: dict | None = None,
) -> WalkOutput:
    """Algorithm 2: evaluate queries one by one, scalar steps (wo/si)."""
    sources = np.asarray(sources, dtype=np.int64)
    qids = np.arange(len(sources), dtype=np.int64) if qids is None else np.asarray(qids)
    step = _make_scalar_stepper(csr, app, seed, timers)
    out = _OutBuffer()
    for qid, src in zip(qids, sources):
        qid, cur = int(qid), int(src)
        prev, length = -1, 0
        path = [cur]
        while True:
            nxt = step(qid, cur, prev, length)
            if nxt < 0:
                break
            prev, cur = cur, nxt
            length += 1
            path.append(cur)
            if app.stop_scalar(seed, qid, length):
                break
        out.add(np.full(len(path), qid), np.arange(len(path)), np.array(path))
    return out.finish(timers=timers)


# ---------------------------------------------------------------------------
# Step-interleaved ring engine (Algorithm 4) — ThunderRW w/si.
# ---------------------------------------------------------------------------

def run_interleaved(
    csr: CSRGraph,
    app: RandomWalkApp,
    sources: np.ndarray,
    qids: np.ndarray | None = None,
    seed: int = 0,
    ring_size: int = 64,
    timers: dict | None = None,
) -> WalkOutput:
    """Algorithm 4: GMU over a ring of ≤ ``ring_size`` in-flight walkers.

    Each loop iteration moves every walker in the ring by one step with
    vectorized Gather/Move/Update; completed walkers are replaced from the
    pending queue, so the ring stays full (no BSP tail problem).
    """
    sources = np.asarray(sources, dtype=np.int64)
    n = len(sources)
    qids = np.arange(n, dtype=np.int64) if qids is None else np.asarray(qids, dtype=np.int64)
    out = _OutBuffer()
    out.add(qids, np.zeros(n, dtype=np.int32), sources)  # step-0 rows
    if n == 0:
        return out.finish(timers=timers)

    indptr, dst_arr = csr.indptr, csr.dst
    dynamic = app.walker_type is WalkerType.DYNAMIC
    sampler = app.sampler
    tab = _static_tables(csr, app)
    pstar_const = _orej_pstar(app, csr) if sampler == "orej" else None
    clock = time.perf_counter if timers is not None else None

    def tick(key: str, t0: float) -> float:
        t1 = time.perf_counter()
        timers[key] = timers.get(key, 0.0) + (t1 - t0)
        return t1

    k = max(1, int(ring_size))
    fill = min(k, n)
    r_qid = qids[:fill].copy()
    r_cur = sources[:fill].copy()
    r_prev = np.full(fill, -1, dtype=np.int64)
    r_len = np.zeros(fill, dtype=np.int64)
    submitted = fill
    iters = 0

    while len(r_qid) > 0:
        iters += 1
        vs = r_cur
        starts = indptr[vs]
        counts = (indptr[vs + 1] - starts).astype(np.int64)
        local = np.full(len(vs), -1, dtype=np.int64)

        if dynamic and sampler != "orej":
            # -- Gather: flatten ragged segments, apply the Weight UDF. --
            t0 = clock() if clock else 0.0
            flat_idx, seg_ids, _, _ = flatten_segments(indptr, vs)
            w = app.weight_fn(csr, flat_idx, r_prev[seg_ids], r_len[seg_ids])
            if clock:
                t0 = tick("weight", t0)
            seg_ends = np.cumsum(counts)
            seg_starts = seg_ends - counts
            if sampler == "its":
                cum, totals = preprocess.its_dynamic_init(w, counts)
                if clock:
                    t0 = tick("init", t0)
                local = its_m.generate_batch(cum, seg_starts, counts, totals, seed, r_qid, r_len)
            elif sampler == "alias":
                prob, a1, a2, ok = preprocess.alias_dynamic_init(w, counts)
                if clock:
                    t0 = tick("init", t0)
                local = alias_m.generate_batch(prob, a1, a2, seg_starts, counts, seed, r_qid, r_len)
                local = np.where(ok, local, -1)
            elif sampler == "rej":
                pm = preprocess.rej_dynamic_init(w, counts)
                if clock:
                    t0 = tick("init", t0)
                local = rej_m.generate_batch(w, seg_starts, counts, pm, seed, r_qid, r_len)
            else:
                raise ValueError(f"sampler {sampler!r} unsupported for dynamic RW")
            if clock:
                tick("gen", t0)
        elif sampler == "orej":
            t0 = clock() if clock else 0.0

            def probe(flat_edge_idx: np.ndarray, rows: np.ndarray) -> np.ndarray:
                if dynamic:
                    return app.weight_fn(csr, flat_edge_idx, r_prev[rows], r_len[rows])
                return tab["weights"][flat_edge_idx]

            pstar = np.full(len(vs), pstar_const)
            local = orej_m.generate_batch(starts, counts, pstar, probe, seed, r_qid, r_len)
            if clock:
                tick("gen", t0)
        else:
            # -- Move only: preprocessed tables (static/unbiased). --
            t0 = clock() if clock else 0.0
            if sampler == "naive":
                local = naive_m.generate_batch(counts, seed, r_qid, r_len)
                local = np.where(counts > 0, local, -1)
            elif sampler == "its":
                local = its_m.generate_batch(
                    tab["cum"], starts, counts, tab["totals"][vs], seed, r_qid, r_len
                )
            elif sampler == "alias":
                local = alias_m.generate_batch(
                    tab["prob"], tab["a1"], tab["a2"], starts, counts, seed, r_qid, r_len
                )
            elif sampler == "rej":
                local = rej_m.generate_batch(
                    tab["weights"], starts, counts, tab["pmax"][vs], seed, r_qid, r_len
                )
            else:
                raise ValueError(f"unknown sampler {sampler!r}")
            if clock:
                tick("gen", t0)

        moved = local >= 0
        # Clamp unmoved walkers' index to 0: a sink's `starts` can equal
        # |E| and must never be dereferenced.
        safe_idx = np.where(moved, starts + local, 0)
        nxt = np.where(moved, dst_arr[safe_idx], -1)

        # -- Update: record moves, apply termination, refill the ring. --
        new_len = r_len + 1
        if moved.any():
            out.add(r_qid[moved], new_len[moved].astype(np.int32), nxt[moved])
        stop = ~moved
        stop[moved] |= app.stop_mask(seed, r_qid[moved], new_len[moved])
        r_prev = np.where(moved, r_cur, r_prev)
        r_cur = np.where(moved, nxt, r_cur)
        r_len = new_len

        if stop.any():
            keep = ~stop
            n_free = int(stop.sum())
            n_new = min(n_free, n - submitted)
            if n_new > 0:
                new_q = qids[submitted : submitted + n_new]
                new_s = sources[submitted : submitted + n_new]
                submitted += n_new
                r_qid = np.concatenate([r_qid[keep], new_q])
                r_cur = np.concatenate([r_cur[keep], new_s])
                r_prev = np.concatenate([r_prev[keep], np.full(n_new, -1, dtype=np.int64)])
                r_len = np.concatenate([r_len[keep], np.zeros(n_new, dtype=np.int64)])
            else:
                r_qid, r_cur, r_prev, r_len = (
                    r_qid[keep], r_cur[keep], r_prev[keep], r_len[keep],
                )
    return out.finish(timers=timers, meta={"ring_iterations": iters, "ring_size": k})


# ---------------------------------------------------------------------------
# Execution-model emulations of the comparison systems (Appendix C.4).
# ---------------------------------------------------------------------------

def run_bsp(
    csr: CSRGraph,
    app: RandomWalkApp,
    sources: np.ndarray,
    qids: np.ndarray | None = None,
    seed: int = 0,
) -> WalkOutput:
    """KnightKing's BSP model: every superstep moves all active queries one
    step; queries are scalar task units. Exhibits the tail problem — late
    supersteps carry few active queries but full sweep bookkeeping."""
    sources = np.asarray(sources, dtype=np.int64)
    n = len(sources)
    qids = np.arange(n, dtype=np.int64) if qids is None else np.asarray(qids, dtype=np.int64)
    step = _make_scalar_stepper(csr, app, seed)
    cur = sources.copy()
    prev = np.full(n, -1, dtype=np.int64)
    length = np.zeros(n, dtype=np.int64)
    active = np.ones(n, dtype=bool)
    out = _OutBuffer()
    out.add(qids, np.zeros(n, dtype=np.int32), sources)
    supersteps = 0
    while active.any():
        supersteps += 1
        for i in np.flatnonzero(active):
            nxt = step(int(qids[i]), int(cur[i]), int(prev[i]), int(length[i]))
            if nxt < 0:
                active[i] = False
                continue
            prev[i], cur[i] = cur[i], nxt
            length[i] += 1
            out.add([qids[i]], [length[i]], [nxt])
            if app.stop_scalar(seed, int(qids[i]), int(length[i])):
                active[i] = False
    return out.finish(meta={"supersteps": supersteps})


def run_asp(
    csr: CSRGraph,
    app: RandomWalkApp,
    sources: np.ndarray,
    qids: np.ndarray | None = None,
    seed: int = 0,
    n_graph_partitions: int = 8,
) -> WalkOutput:
    """GraphWalker's ASP model (in-memory configuration, unbiased only).

    Vertices are split into contiguous ranges; parked queries wait for
    their partition to be "loaded" (the scheduler picks the fullest one).
    A loaded query runs until it terminates or leaves the partition.
    """
    if app.walker_type is not WalkerType.UNBIASED:
        raise ValueError("GraphWalker supports unbiased RW only (§2.4)")
    sources = np.asarray(sources, dtype=np.int64)
    n = len(sources)
    qids = np.arange(n, dtype=np.int64) if qids is None else np.asarray(qids, dtype=np.int64)
    step = _make_scalar_stepper(csr, app, seed)
    nv = csr.num_vertices
    P = max(1, min(n_graph_partitions, nv))

    def part_of(v: int) -> int:
        return min(P - 1, v * P // nv)

    queues: list[list[tuple[int, int, int, int]]] = [[] for _ in range(P)]
    for qid, src in zip(qids, sources):
        queues[part_of(int(src))].append((int(qid), int(src), -1, 0))
    out = _OutBuffer()
    out.add(qids, np.zeros(n, dtype=np.int32), sources)
    swaps = 0
    remaining = n
    while remaining > 0:
        p = max(range(P), key=lambda i: len(queues[i]))
        batch, queues[p] = queues[p], []
        swaps += 1
        for qid, cur, prev, length in batch:
            while True:
                nxt = step(qid, cur, prev, length)
                if nxt < 0:
                    remaining -= 1
                    break
                prev, cur = cur, nxt
                length += 1
                out.add([qid], [length], [nxt])
                if app.stop_scalar(seed, qid, length):
                    remaining -= 1
                    break
                if part_of(cur) != p:
                    queues[part_of(cur)].append((qid, cur, prev, length))
                    break
    return out.finish(meta={"partition_loads": swaps, "n_partitions": P})


def run_walks(
    csr: CSRGraph,
    app: RandomWalkApp,
    sources: np.ndarray,
    engine: str = "interleaved",
    seed: int = 0,
    qids: np.ndarray | None = None,
    **kw,
) -> WalkOutput:
    """Dispatch by engine name (see module docstring)."""
    fns = {
        "sequential": run_sequential,
        "interleaved": run_interleaved,
        "bsp": run_bsp,
        "asp": run_asp,
    }
    if engine not in fns:
        raise ValueError(f"unknown engine {engine!r}; pick one of {ENGINES}")
    return fns[engine](csr, app, sources, qids=qids, seed=seed, **kw)
