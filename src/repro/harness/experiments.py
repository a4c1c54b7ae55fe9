"""Per-table experiment drivers (§5) — each returns printable row dicts.

Scale note: the paper runs 10-minute streams of real graphs (63M edges SO,
40M LDBC, 220M Yago) on a 32-core server; we run seconds-scale synthetic
streams (DESIGN.md §3). Row *shapes* (orderings, ratios, trends) are the
reproduction target, recorded against the paper's numbers in EXPERIMENTS.md.

Every driver takes a ``scale`` multiplier so jobs can run bigger sweeps than
the default test-sized ones.
"""
from __future__ import annotations

import time

from ..core.queries import Query, make_query, workload
from ..core.rapq import RAPQEngine
from ..core.rspq import RSPQEngine
from ..rpq_oracle import Sgt
from ..streams.generators import dataset_stream, with_deletions
from ..streams.gmark import gmark_stream, gmark_workload
from .runner import RunMetrics, run_engine

# Window/slide defaults per dataset, in stream time units (the paper uses
# 1 month/1 day for SO, 10 days/1 day for LDBC, 10M/1M edges for Yago; we
# keep the same ~10:1 window:slide shape).
DATASET_WINDOWS = {"so": (60, 6), "ldbc": (100, 10), "yago": (100, 10)}
DEFAULT_EDGES = {"so": 3000, "ldbc": 4000, "yago": 4000}

RSPQ_BUDGET = 200_000


def _rapq_run(q: Query, stream, window, slide) -> RunMetrics:
    return run_engine(RAPQEngine(q.dfa, window=window, slide=slide), stream)


def _rspq_run(q: Query, stream, window, slide, budget=RSPQ_BUDGET) -> RunMetrics:
    return run_engine(
        RSPQEngine(q.dfa, window=window, slide=slide, budget=budget), stream
    )


# ----------------------------------------------------------------------
# Table 1 — amortized complexity validation
# ----------------------------------------------------------------------

def table1_complexity(scale: float = 1.0) -> list[dict]:
    """Empirical check of the O(n·k²) / O(n²·k) amortized costs.

    Sweeps (a) window size |W| (∝ n, the distinct vertices in the window) at
    fixed k, and (b) automaton size k at fixed |W|, on the Yago-like stream;
    plus the deletion path at a fixed ratio. Reports mean/p99 per-tuple time
    — the paper's Table 1 is validated if mean latency grows ~linearly in
    |W| and stays polynomially modest in k.
    """
    from ..core.queries import query_from_text

    n_edges = int(6000 * scale)
    rows = []
    # Dense matching (3 of 8 labels, recursive) so the window content — and
    # hence n — actually grows with |W|; on a highly selective query the
    # per-tuple cost is dominated by fixed overhead and the trend vanishes.
    stream = gmark_stream(n_edges)
    q = query_from_text("(g0|g1|g2)*", name="star3")
    for w in (25, 50, 100, 200):
        m = _rapq_run(q, stream, window=w, slide=max(1, w // 10))
        rows.append(
            {
                "sweep": "|W| (k fixed)",
                "value": w,
                "mean_us": m.mean_us,
                "p99_us": m.p99_us,
                "throughput": m.throughput,
                "max_nodes": m.max_nodes,
            }
        )
    # k sweep: label chains of length 2/4/8 at fixed |W|.
    for k_labels in (2, 4, 8):
        text = " ".join(f"g{i % 8}" for i in range(k_labels))
        q_k = query_from_text(text, name=f"chain{k_labels}")
        m = _rapq_run(q_k, stream, window=100, slide=10)
        rows.append(
            {
                "sweep": "k (|W| fixed)",
                "value": q_k.k,
                "mean_us": m.mean_us,
                "p99_us": m.p99_us,
                "throughput": m.throughput,
                "max_nodes": m.max_nodes,
            }
        )
    # Deletion path (O(n²·k) bound).
    del_stream = with_deletions(stream[: n_edges // 2], 0.05)
    m = _rapq_run(q, del_stream, window=100, slide=10)
    rows.append(
        {
            "sweep": "5% deletions",
            "value": 100,
            "mean_us": m.mean_us,
            "p99_us": m.p99_us,
            "throughput": m.throughput,
            "max_nodes": m.max_nodes,
        }
    )
    return rows


# ----------------------------------------------------------------------
# Table 2 / Table 3 — workload definitions
# ----------------------------------------------------------------------

def table2_queries() -> list[dict]:
    """The Table 2 templates with their minimal-DFA sizes per dataset."""
    rows = []
    from ..core.queries import TEMPLATES

    for name, template in TEMPLATES.items():
        per_ds = {}
        for ds in ("so", "ldbc", "yago"):
            try:
                qs = [q for q in workload(ds) if q.name == name]
                per_ds[ds] = qs[0].k if qs else "-"
            except Exception:  # pragma: no cover - defensive
                per_ds[ds] = "-"
        rows.append(
            {
                "query": name,
                "template": template,
                "k_so": per_ds["so"],
                "k_ldbc": per_ds["ldbc"],
                "k_yago": per_ds["yago"],
            }
        )
    return rows


def table3_labels() -> list[dict]:
    """Label bindings per dataset (corrected Table 3, see DESIGN.md)."""
    from ..core.queries import LABEL_BINDINGS

    return [
        {
            "graph": ds,
            "bindings": ", ".join(
                f"{k}={v}" for k, v in sorted(LABEL_BINDINGS[ds].items())
            ),
        }
        for ds in ("so", "ldbc", "yago")
    ]


# ----------------------------------------------------------------------
# Figure 4 (as a table) — throughput & tail latency per query per graph
# ----------------------------------------------------------------------

def fig4_throughput(datasets=("so", "ldbc", "yago"), scale: float = 1.0) -> list[dict]:
    rows = []
    for ds in datasets:
        window, slide = DATASET_WINDOWS[ds]
        stream = dataset_stream(ds, int(DEFAULT_EDGES[ds] * scale))
        for q in workload(ds):
            m = _rapq_run(q, stream, window, slide)
            rows.append(
                {
                    "dataset": ds,
                    "query": q.name,
                    "throughput_eps": m.throughput,
                    "p99_ms": m.p99_us / 1e3,
                    "mean_us": m.mean_us,
                    "results": m.n_results,
                }
            )
    return rows


# ----------------------------------------------------------------------
# Figure 5 (as a table) — Δ index size per query on the SO-like graph
# ----------------------------------------------------------------------

def fig5_index_size(scale: float = 1.0) -> list[dict]:
    window, slide = DATASET_WINDOWS["so"]
    stream = dataset_stream("so", int(DEFAULT_EDGES["so"] * scale))
    rows = []
    for q in workload("so"):
        m = _rapq_run(q, stream, window, slide)
        rows.append(
            {
                "query": q.name,
                "max_trees": m.max_trees,
                "max_nodes": m.max_nodes,
                "throughput_eps": m.throughput,
            }
        )
    return rows


# ----------------------------------------------------------------------
# Figure 6 (as a table) — |W| and β scalability on the Yago-like graph
# ----------------------------------------------------------------------

def _measure_with_expiry_share(q: Query, stream, window: int, beta: int) -> dict:
    """Run RAPQ measuring latency quantiles plus expiry cost attribution.

    A tuple that crosses a slide boundary pays for Algorithm ExpiryRAPQ
    inside its processing time; summing those tuples' times approximates the
    window-maintenance cost the paper plots in Fig 6(b).
    """
    # Use the denser gMark stream for the sweep so windows hold real state.
    engine = RAPQEngine(q.dfa, window=window, slide=beta)
    expiry_time = 0.0
    n_expiries = 0
    lat: list[float] = []
    t_start = time.perf_counter()
    for sgt in stream:
        s0 = time.perf_counter()
        boundary = (sgt.ts // beta) * beta
        will_expire = boundary > engine._last_boundary
        engine.process(sgt)
        dt = time.perf_counter() - s0
        if will_expire:
            expiry_time += dt
            n_expiries += 1
        if sgt.label in q.dfa.alphabet:
            lat.append(dt * 1e6)
    total = time.perf_counter() - t_start
    lat.sort()
    return {
        "p99_us": lat[int(0.99 * len(lat))] if lat else 0.0,
        "mean_us": (sum(lat) / len(lat)) if lat else 0.0,
        "throughput_eps": len(lat) / total if total else 0.0,
        "expiry_share_pct": round(100.0 * expiry_time / total, 2) if total else 0.0,
        "expiry_ms_per_slide": round(expiry_time * 1e3 / n_expiries, 3)
        if n_expiries
        else 0.0,
    }


def fig6_scalability(scale: float = 1.0) -> list[dict]:
    from ..core.queries import query_from_text

    stream = gmark_stream(int(6000 * scale))
    q = query_from_text("g0 (g1|g2)*", name="Q3-like")
    rows = []
    for w in (50, 100, 200, 400):
        m = _measure_with_expiry_share(q, stream, window=w, beta=10)
        rows.append({"sweep": "|W|", "value": w, **m})
    for beta in (5, 10, 20, 40):
        m = _measure_with_expiry_share(q, stream, window=100, beta=beta)
        rows.append({"sweep": "beta", "value": beta, **m})
    return rows


# ----------------------------------------------------------------------
# Figures 7-9 (as tables) — gMark query-size sweep
# ----------------------------------------------------------------------

def fig7_9_gmark(n_queries: int = 40, scale: float = 1.0) -> list[dict]:
    """DFA size vs query size; throughput vs k; throughput vs index size."""
    stream = gmark_stream(int(4000 * scale))
    rows = []
    for q in gmark_workload(n_queries):
        m = _rapq_run(q, stream, window=100, slide=10)
        rows.append(
            {
                "query": q.name,
                "size": q.size,
                "k": q.k,
                "throughput_eps": m.throughput,
                "max_nodes": m.max_nodes,
                "p99_us": m.p99_us,
            }
        )
    return rows


def gmark_summary(rows: list[dict]) -> list[dict]:
    """Aggregate fig7_9 rows: per query-size bucket, mean k and throughput."""
    buckets: dict[int, list[dict]] = {}
    for r in rows:
        buckets.setdefault(r["size"] // 4, []).append(r)
    out = []
    for b in sorted(buckets):
        rs = buckets[b]
        out.append(
            {
                "size_bucket": f"{b * 4}-{b * 4 + 3}",
                "n": len(rs),
                "mean_k": sum(r["k"] for r in rs) / len(rs),
                "max_k": max(r["k"] for r in rs),
                "mean_throughput_eps": sum(r["throughput_eps"] for r in rs) / len(rs),
            }
        )
    return out


# ----------------------------------------------------------------------
# Table 4 — simple path semantics feasibility + overhead
# ----------------------------------------------------------------------

def table4_simple_path(datasets=("so", "ldbc", "yago"), scale: float = 1.0) -> list[dict]:
    rows = []
    for ds in datasets:
        window, slide = DATASET_WINDOWS[ds]
        stream = dataset_stream(ds, int(DEFAULT_EDGES[ds] * scale))
        for q in workload(ds):
            base = _rapq_run(q, stream, window, slide)
            simple = _rspq_run(q, stream, window, slide)
            overhead = (
                simple.p99_us / base.p99_us if base.p99_us and not simple.failed else None
            )
            rows.append(
                {
                    "dataset": ds,
                    "query": q.name,
                    "restricted": q.dfa.has_containment_property,
                    "success": not simple.failed,
                    "p99_overhead": round(overhead, 2) if overhead else "-",
                    "conflicts": simple.conflicts,
                }
            )
    return rows


# ----------------------------------------------------------------------
# Figure 10 (as a table) — explicit deletion ratio sweep
# ----------------------------------------------------------------------

def fig10_deletions(scale: float = 1.0, queries=("Q1", "Q2", "Q7", "Q11")) -> list[dict]:
    window, slide = DATASET_WINDOWS["yago"]
    base_stream = dataset_stream("yago", int(DEFAULT_EDGES["yago"] * scale))
    rows = []
    for name in queries:
        q = [x for x in workload("yago") if x.name == name][0]
        base = _rapq_run(q, base_stream, window, slide)
        for ratio in (0.02, 0.05, 0.10):
            stream = with_deletions(base_stream, ratio)
            m = _rapq_run(q, stream, window, slide)
            rows.append(
                {
                    "query": name,
                    "del_ratio_pct": int(ratio * 100),
                    "p99_us": m.p99_us,
                    "p99_vs_no_del": round(m.p99_us / base.p99_us, 2)
                    if base.p99_us
                    else "-",
                }
            )
    return rows


# ----------------------------------------------------------------------
# Figure 11 (as a table) — incremental vs batch re-evaluation (needs Spark)
# ----------------------------------------------------------------------

def fig11_speedup(spark, queries=("Q1", "Q2", "Q11"), scale: float = 1.0) -> list[dict]:
    """Incremental Algorithm RAPQ vs per-slide batch re-evaluation (§5.6).

    Mirrors the paper's comparison: their in-memory incremental engine vs an
    emulation layer that re-evaluates the query over the window content on a
    DBMS after updates (Virtuoso). Here the incremental side is the Δ-tree
    RAPQ engine and the baseline re-runs the Spark DataFrame batch fixpoint
    on the window snapshot once per slide — already more generous than the
    paper's per-*tuple* re-evaluation. Result sets are asserted equal before
    any timing is reported.

    The dataflow-vs-dataflow variant (IncrementalRPQ vs batch per slide) is
    deliberately *not* the headline here: at laptop scale both are dominated
    by fixed per-job costs, which hides the algorithmic gap the paper
    measures (see EXPERIMENTS.md commentary).
    """
    from ..dataflow.batch_eval import batch_rapq

    window, slide = 100, 25
    stream = dataset_stream("yago", int(1500 * scale))
    chunks: dict[int, list[Sgt]] = {}
    for t in stream:
        chunks.setdefault(t.ts // slide, []).append(t)
    rows = []
    for name in queries:
        q = [x for x in workload("yago") if x.name == name][0]
        # Incremental: Δ-tree engine, per-tuple.
        engine = RAPQEngine(q.dfa, window=window, slide=slide)
        t0 = time.perf_counter()
        for b in sorted(chunks):
            for t in chunks[b]:
                engine.process(t)
        incr_s = time.perf_counter() - t0
        inc_snapshot = engine.derivable_pairs()
        inc_results = set(engine.results)
        # Baseline: re-evaluate the window snapshot per slide with Spark.
        t0 = time.perf_counter()
        seen: dict[tuple, Sgt] = {}
        base_results: set[tuple[str, str]] = set()
        base_snapshot: set[tuple[str, str]] = set()
        for b in sorted(chunks):
            for t in chunks[b]:
                seen[(t.src, t.dst, t.label)] = t
            wm = max(t.ts for t in chunks[b])
            live = [
                (t.src, t.dst, t.label)
                for t in seen.values()
                if t.op == "+" and wm - window < t.ts <= wm
            ]
            edf = spark.createDataFrame(
                live, "src STRING, dst STRING, label STRING"
            )
            base_snapshot = {
                (r["x"], r["y"]) for r in batch_rapq(edf, q.dfa).collect()
            }
            base_results |= base_snapshot
        batch_s = time.perf_counter() - t0
        # The per-slide baseline evaluates a subset of the eager engine's
        # snapshots, so its results must be contained in the incremental
        # ones (strict equality would require per-tuple re-evaluation,
        # which is what the paper's emulation did — and why it was slow).
        assert base_results <= inc_results, name
        assert base_snapshot <= inc_snapshot, name
        n = len(chunks)
        rows.append(
            {
                "query": name,
                "slides": n,
                "incremental_ms_per_slide": incr_s * 1e3 / n,
                "batch_reeval_ms_per_slide": batch_s * 1e3 / n,
                "speedup": round(batch_s / incr_s) if incr_s else "-",
            }
        )
    return rows
