"""Incremental dataflow RPQ engine: micro-batch path-state maintenance.

The distributed realization of Algorithm RAPQ's semantics (arbitrary path,
implicit windows): the state is the relation

    ``paths(x, v, s, ts)``

meaning "some path of length ≥ 1 from ``x`` to vertex ``v`` drives the DFA
from ``s0`` to ``s``, and the best (maximum over witnesses) minimum edge
timestamp is ``ts``". A pair ``(x, v)`` is a result whenever ``s ∈ F``
(excluding the root-revisit corner, DESIGN.md). Window expiry is a filter:
because ``ts`` is the *max-min* over all witnesses, a row whose ``ts`` leaves
the window has no remaining witness — no tree-reconnection pass is needed at
this layer, which is exactly what makes the relational encoding attractive
for dataflow systems.

Per micro-batch of sgts the engine runs a semi-naive delta closure:

1. expire state and window edges against the batch watermark;
2. derive a delta from the new product edges (seeds from ``s0`` + extensions
   of existing paths);
3. iterate ``delta ⋈ window-product-edges`` keeping only improvements
   (new ``(x,v,s)`` or larger ``ts``) until fixpoint;
4. emit result pairs not seen before (append-only output stream).

Explicit deletions take a documented fallback: a batch containing negative
tuples recomputes the closure from the window content (incremental deletion
is the Δ-tree engine's job — the paper's O(n²·k) path; relational
high-performance deletion would need DRed-style over-deletion, out of scope).

Result semantics are Definition 9 at *micro-batch granularity*: the union of
snapshot results at every batch watermark. With one-tuple batches this
coincides with the eager per-tuple semantics, which the tests exercise.

State lives in Spark DataFrames, localCheckpoint-ed each batch to keep plans
bounded; all computation is DataFrame joins/aggregations (Catalyst), no RDDs.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from ..core.dfa import DFA
from .product_graph import transitions_df

_PATH_SCHEMA = "x STRING, v STRING, s INT, ts LONG"
_EDGE_SCHEMA = "src STRING, dst STRING, label STRING, ts LONG"
_RESULT_SCHEMA = "x STRING, y STRING, ts LONG"


def _best(df: DataFrame, keys: list[str]) -> DataFrame:
    """Keep the max-ts row per key group."""
    return df.groupBy(*keys).agg(F.max("ts").alias("ts"))


class IncrementalRPQ:
    """Micro-batch incremental RPQ evaluation over a sliding window."""

    def __init__(self, spark: SparkSession, dfa: DFA, window: int):
        self.spark = spark
        self.dfa = dfa
        self.window = window
        self.trans = transitions_df(spark, dfa).localCheckpoint(eager=True)
        self.edges = spark.createDataFrame([], _EDGE_SCHEMA).localCheckpoint(True)
        self.paths = spark.createDataFrame([], _PATH_SCHEMA).localCheckpoint(True)
        self.result_rows = spark.createDataFrame([], _RESULT_SCHEMA).localCheckpoint(True)
        self.watermark: int | None = None
        self.closure_rounds = 0

    # ------------------------------------------------------------------

    def process_batch(self, batch: DataFrame) -> DataFrame:
        """Consume one micro-batch of sgts; returns newly appended results.

        ``batch`` columns: ``ts, src, dst, label, op``. Timestamps must be
        ≥ the previous watermark (in-order streams, paper §2).
        """
        if batch.isEmpty():
            return self.spark.createDataFrame([], _RESULT_SCHEMA)
        wm = batch.agg(F.max("ts")).collect()[0][0]
        self.watermark = wm if self.watermark is None else max(self.watermark, wm)
        lo = self.watermark - self.window

        has_deletes = not batch.filter(F.col("op") == "-").isEmpty()
        inserts = (
            batch.filter(F.col("op") == "+")
            .join(self.trans.select("label").distinct(), on="label")
            .select("src", "dst", "label", "ts")
        )

        # --- window edge-state maintenance (latest ts per edge identity).
        if has_deletes:
            self._apply_ops_in_order(batch)
        else:
            self.edges = _best(
                self.edges.unionByName(inserts), ["src", "dst", "label"]
            )
        # One materialization point per batch for the edge state; everything
        # downstream (product, closure) reads the checkpointed relation.
        self.edges = self.edges.filter(F.col("ts") > lo).localCheckpoint(True)

        if has_deletes:
            # Documented fallback: deletions invalidate arbitrary suffixes of
            # the path state; recompute the closure from the window content.
            new_paths = self._full_closure()
            self.paths = new_paths.localCheckpoint(True)
        else:
            delta = self._delta_from(inserts, lo)
            self._merge_closure(delta, lo)

        self.paths = self.paths.filter(F.col("ts") > lo).localCheckpoint(True)
        return self._emit_new_results()

    # ------------------------------------------------------------------

    def _apply_ops_in_order(self, batch: DataFrame) -> None:
        """Apply +/- ops respecting intra-batch order (latest op wins)."""
        w = Window.partitionBy("src", "dst", "label").orderBy(F.col("ts").desc())
        merged = (
            self.edges.withColumn("op", F.lit("+"))
            .unionByName(batch.select("src", "dst", "label", "ts", "op"))
            .withColumn("rn", F.row_number().over(w))
            .filter((F.col("rn") == 1) & (F.col("op") == "+"))
            .join(self.trans.select("label").distinct(), on="label")
            .select("src", "dst", "label", "ts")
        )
        self.edges = merged

    def _product(self, edges: DataFrame) -> DataFrame:
        return edges.join(self.trans, on="label").select(
            F.col("src").alias("src_v"),
            "src_s",
            F.col("dst").alias("dst_v"),
            "dst_s",
            "ts",
        )

    def _delta_from(self, inserts: DataFrame, lo: int) -> DataFrame:
        """Initial delta: seeds + one-step extensions through new edges."""
        new_pe = self._product(inserts.filter(F.col("ts") > lo))
        seeds = new_pe.filter(F.col("src_s") == self.dfa.start).select(
            F.col("src_v").alias("x"),
            F.col("dst_v").alias("v"),
            F.col("dst_s").alias("s"),
            "ts",
        )
        ext = (
            self.paths.alias("p")
            .join(
                new_pe.alias("e"),
                (F.col("p.v") == F.col("e.src_v"))
                & (F.col("p.s") == F.col("e.src_s")),
            )
            .select(
                F.col("p.x").alias("x"),
                F.col("e.dst_v").alias("v"),
                F.col("e.dst_s").alias("s"),
                F.least(F.col("p.ts"), F.col("e.ts")).alias("ts"),
            )
        )
        return _best(seeds.unionByName(ext), ["x", "v", "s"])

    def _improvements(self, candidate: DataFrame) -> DataFrame:
        """Rows of ``candidate`` that are new or improve the stored ts."""
        joined = candidate.alias("c").join(
            self.paths.alias("p"),
            on=[
                F.col("c.x") == F.col("p.x"),
                F.col("c.v") == F.col("p.v"),
                F.col("c.s") == F.col("p.s"),
            ],
            how="left",
        )
        return joined.filter(
            F.col("p.ts").isNull() | (F.col("c.ts") > F.col("p.ts"))
        ).select(
            F.col("c.x").alias("x"),
            F.col("c.v").alias("v"),
            F.col("c.s").alias("s"),
            F.col("c.ts").alias("ts"),
        )

    def _merge_closure(self, delta: DataFrame, lo: int, max_rounds: int = 200) -> None:
        """Semi-naive: fold improvements into state, expand until fixpoint.

        Only the per-round delta is materialized (``localCheckpoint``): it is
        consumed by both the emptiness test and two joins, and truncating it
        keeps the loop's plan size constant. The accumulated ``paths`` state
        stays lazy within the batch — ``process_batch`` checkpoints it once
        at the end.
        """
        window_pe = self._product(self.edges).localCheckpoint(True)
        delta = self._improvements(delta).localCheckpoint(True)
        rounds = 0
        while not delta.isEmpty():
            rounds += 1
            if rounds > max_rounds:
                raise RuntimeError("closure did not converge")
            self.paths = _best(self.paths.unionByName(delta), ["x", "v", "s"])
            grown = (
                delta.alias("d")
                .join(
                    window_pe.alias("e"),
                    (F.col("d.v") == F.col("e.src_v"))
                    & (F.col("d.s") == F.col("e.src_s")),
                )
                .select(
                    F.col("d.x").alias("x"),
                    F.col("e.dst_v").alias("v"),
                    F.col("e.dst_s").alias("s"),
                    F.least(F.col("d.ts"), F.col("e.ts")).alias("ts"),
                )
                .filter(F.col("ts") > lo)
            )
            delta = self._improvements(
                _best(grown, ["x", "v", "s"])
            ).localCheckpoint(True)
        self.closure_rounds += rounds

    def _full_closure(self) -> DataFrame:
        """Recompute ``paths`` from the current window edges (deletion path)."""
        pe = self._product(self.edges).localCheckpoint(True)
        reach = (
            pe.filter(F.col("src_s") == self.dfa.start)
            .select(
                F.col("src_v").alias("x"),
                F.col("dst_v").alias("v"),
                F.col("dst_s").alias("s"),
                "ts",
            )
        )
        reach = _best(reach, ["x", "v", "s"]).localCheckpoint(True)
        frontier = reach
        for _ in range(200):
            if frontier.isEmpty():
                break
            grown = (
                frontier.alias("f")
                .join(
                    pe.alias("e"),
                    (F.col("f.v") == F.col("e.src_v"))
                    & (F.col("f.s") == F.col("e.src_s")),
                )
                .select(
                    F.col("f.x").alias("x"),
                    F.col("e.dst_v").alias("v"),
                    F.col("e.dst_s").alias("s"),
                    F.least(F.col("f.ts"), F.col("e.ts")).alias("ts"),
                )
            )
            grown = _best(grown, ["x", "v", "s"])
            improved = (
                grown.alias("c")
                .join(
                    reach.alias("p"),
                    on=[
                        F.col("c.x") == F.col("p.x"),
                        F.col("c.v") == F.col("p.v"),
                        F.col("c.s") == F.col("p.s"),
                    ],
                    how="left",
                )
                .filter(F.col("p.ts").isNull() | (F.col("c.ts") > F.col("p.ts")))
                .select(
                    F.col("c.x").alias("x"),
                    F.col("c.v").alias("v"),
                    F.col("c.s").alias("s"),
                    F.col("c.ts").alias("ts"),
                )
                .localCheckpoint(True)
            )
            if improved.isEmpty():
                break
            reach = _best(reach.unionByName(improved), ["x", "v", "s"]).localCheckpoint(True)
            frontier = improved
        else:
            raise RuntimeError("full closure did not converge")
        return reach

    def _emit_new_results(self) -> DataFrame:
        finals = [int(f) for f in self.dfa.finals]
        pairs = (
            self.paths.filter(F.col("s").isin(finals))
            .filter(~((F.col("v") == F.col("x")) & (F.col("s") == F.lit(self.dfa.start))))
            .select("x", F.col("v").alias("y"), "ts")
        )
        pairs = pairs.groupBy("x", "y").agg(F.min("ts").alias("ts"))
        new = pairs.join(
            self.result_rows.select("x", "y"), on=["x", "y"], how="left_anti"
        ).localCheckpoint(True)
        self.result_rows = self.result_rows.unionByName(new).localCheckpoint(True)
        return new

    # ------------------------------------------------------------------

    def results(self) -> set[tuple[str, str]]:
        """All pairs appended to the output stream so far."""
        return {(r["x"], r["y"]) for r in self.result_rows.collect()}

    def derivable_pairs(self) -> set[tuple[str, str]]:
        """Pairs witnessed by the current path state (current snapshot)."""
        finals = [int(f) for f in self.dfa.finals]
        rows = (
            self.paths.filter(F.col("s").isin(finals))
            .filter(~((F.col("v") == F.col("x")) & (F.col("s") == F.lit(self.dfa.start))))
            .select("x", "v")
            .distinct()
            .collect()
        )
        return {(r["x"], r["v"]) for r in rows}
