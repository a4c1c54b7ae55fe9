"""Batch RPQ evaluation on a static snapshot with Spark DataFrame fixpoints.

This is (a) the paper's §3 "Batch Algorithm" — traverse the product graph
from every ``(x, s0)`` — expressed as a semi-naive Datalog-style fixpoint
over DataFrames, and (b) the re-evaluation baseline used in §5.6: the
Virtuoso emulation re-ran the query over the window content after updates,
which is exactly what :func:`batch_rapq` per snapshot does (see
``dataflow/incremental.py`` for the incremental engine it is compared to in
the Fig. 11 experiment).

The iteration joins the frontier with the product-edge relation until no new
``(x, v, s)`` fact appears. ``localCheckpoint`` truncates lineage each round
so plans stay bounded regardless of the product graph's diameter.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from ..core.dfa import DFA
from .product_graph import product_edges


def batch_rapq(edges: DataFrame, dfa: DFA, max_iterations: int = 200) -> DataFrame:
    """Arbitrary-path RPQ result pairs ``(x, y)`` on a static edge snapshot.

    ``edges`` needs columns ``src, dst, label``. Returns a DataFrame with
    columns ``x, y`` — the distinct vertex pairs connected by a path of
    length ≥ 1 whose label is in L(R). The pair ``(x, x)`` is included only
    when a cycle reaches ``x`` in a non-start final state (engine-faithful
    semantics, DESIGN.md).
    """
    pe = (
        product_edges(edges, dfa)
        .select("src_v", "src_s", "dst_v", "dst_s")
        .distinct()
        .localCheckpoint(eager=True)
    )
    # Seed: one hop from every (x, s0).
    reach = (
        pe.filter(F.col("src_s") == dfa.start)
        .select(
            F.col("src_v").alias("x"),
            F.col("dst_v").alias("v"),
            F.col("dst_s").alias("s"),
        )
        .distinct()
        .localCheckpoint(eager=True)
    )
    frontier = reach
    for _ in range(max_iterations):
        if frontier.isEmpty():
            break
        grown = (
            frontier.join(
                pe,
                (frontier["v"] == pe["src_v"]) & (frontier["s"] == pe["src_s"]),
            )
            .select(
                frontier["x"],
                pe["dst_v"].alias("v"),
                pe["dst_s"].alias("s"),
            )
            .distinct()
        )
        frontier = grown.exceptAll(reach).distinct().localCheckpoint(eager=True)
        if frontier.isEmpty():
            break
        reach = reach.union(frontier).localCheckpoint(eager=True)
    else:
        raise RuntimeError(f"fixpoint did not converge in {max_iterations} rounds")
    finals = [int(f) for f in dfa.finals]
    return (
        reach.filter(F.col("s").isin(finals))
        .filter(~((F.col("v") == F.col("x")) & (F.col("s") == F.lit(dfa.start))))
        .select("x", F.col("v").alias("y"))
        .distinct()
    )


def batch_rapq_counts(edges: DataFrame, dfa: DFA) -> int:
    """Result cardinality of :func:`batch_rapq` (benchmark helper)."""
    return batch_rapq(edges, dfa).count()


def windowed_recompute(
    sgts: DataFrame, dfa: DFA, window: int, watermark: int
) -> DataFrame:
    """The §5.6 baseline step: filter the window content, re-run the batch.

    ``sgts`` has columns ``ts, src, dst, label, op``; the snapshot applies
    the latest op per (src, dst, label) and keeps inserts inside
    ``(watermark − |W|, watermark]``, then evaluates from scratch.
    """
    w = F.col("ts")
    latest = (
        sgts.filter(w <= watermark)
        .withColumn(
            "rn",
            F.row_number().over(
                Window.partitionBy("src", "dst", "label").orderBy(
                    F.col("ts").desc()
                )
            ),
        )
        .filter(F.col("rn") == 1)
        .filter((F.col("op") == "+") & (w > watermark - window))
        .select("src", "dst", "label")
    )
    return batch_rapq(latest, dfa)
