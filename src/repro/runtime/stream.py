"""Spark realization of PaSh streams.

A Unix stream (ordered lines) is a DataFrame with columns ``p`` (contiguous
chunk id — the DFG edge's position in its parallel bundle), ``s``
(contiguous 0-based sequence number within ``p``) and ``line``. Total
stream order is lexicographic ``(p, s)``.

Mapping of PaSh runtime primitives (§5) onto Spark:

* map stage  -> fused ``mapInPandas`` over chunk-aligned partitions running
  the black-box command chain per chunk (the n replicated nodes of
  transformation T; consecutive per-chunk stages fuse into one Spark stage
  — exactly PaSh's process-chain-per-width-lane execution),
* aggregate  -> a *deferred* width-1 stage (PaSh's aggregator process).
  When a split follows (the P-after-P pattern of §6.1's sort-sort), the
  aggregate and the re-chunking run in one single-partition task — PaSh
  pipes its aggregator straight into split, so fusing them mirrors the
  process structure while saving a full pass;
* ``split``  -> re-chunking into ``width`` contiguous pieces (count, then
  disperse, like PaSh's split),
* ``cat``    -> union with bundle-offset on ``p`` (order-preserving),
* ``eager``  -> ``persist()`` (a materialized buffer; Spark's scheduler has
  no pipe-laziness — those pathologies are studied in
  :mod:`repro.pipesim`).

**Alignment.** A stream is *aligned* when every chunk ``p`` lives entirely
in one DataFrame partition. Aligned streams run map chains with no shuffle;
split output pays one ``repartitionByRange(p)`` — range, not hash: hash
partitioning collides chunks onto one core while others idle.

**Spark traps encoded here:** ``coalesce(1)`` would collapse upstream maps
into the single task (use ``repartition(1)``); ``Union(coalesce(1), ...)``
is collapsed by Catalyst (ingest uses one range shuffle instead).
"""
from __future__ import annotations

from typing import Callable, List, Optional, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

SCHEMA = "p long, s long, line string"

ChunkFn = Callable[[List[str]], List[str]]
AggFn = Callable[[List[List[str]]], List[str]]


def _chunk_pdf(p: int, lines: List[str]) -> pd.DataFrame:
    return pd.DataFrame(
        {"p": pd.Series([p] * len(lines), dtype="int64"),
         "s": pd.Series(range(len(lines)), dtype="int64"),
         "line": pd.Series(lines, dtype="object")}
    )


def _gather(batches) -> Optional[pd.DataFrame]:
    frames = [b for b in batches if len(b)]
    if not frames:
        return None
    return pd.concat(frames, ignore_index=True) if len(frames) > 1 else frames[0]


def _apply_chain(fns: List[ChunkFn]):
    """mapInPandas fn: run the fused chunk-function chain on every chunk
    (grouped by ``p``) present in this partition."""

    def apply(batches):
        pdf = _gather(batches)
        if pdf is None:
            return
        for p, sub in pdf.groupby("p", sort=True):
            lines = sub.sort_values("s")["line"].tolist()
            for f in fns:
                lines = f(lines)
            yield _chunk_pdf(int(p), lines)

    return apply


def _agg_stage(agg: AggFn, pre_parts: int, post: List[ChunkFn], width: int):
    """mapInPandas fn for the fused aggregate(+post chain)(+re-chunk) stage
    — one single-partition task, like PaSh's aggregator process."""

    def apply(batches):
        pdf = _gather(batches)
        if pdf is None:
            parts: List[List[str]] = [[] for _ in range(pre_parts)]
        else:
            order = np.lexsort((pdf["s"].to_numpy(), pdf["p"].to_numpy()))
            pdf = pdf.iloc[order]
            lines_all = pdf["line"].tolist()
            ps = pdf["p"].to_numpy()
            bounds = np.searchsorted(ps, range(pre_parts + 1))
            parts = [lines_all[bounds[k]: bounds[k + 1]] for k in range(pre_parts)]
        lines = agg(parts)
        for f in post:
            lines = f(lines)
        n = len(lines)
        for k in range(width):
            lo, hi = k * n // width, (k + 1) * n // width
            yield _chunk_pdf(k, lines[lo:hi])

    return apply


def _rechunk(width: int):
    def apply(batches):
        pdf = _gather(batches)
        if pdf is None:
            return
        order = np.lexsort((pdf["s"].to_numpy(), pdf["p"].to_numpy()))
        lines = pdf["line"].to_numpy()[order]
        n = len(lines)
        for k in range(width):
            lo, hi = k * n // width, (k + 1) * n // width
            yield _chunk_pdf(k, list(lines[lo:hi]))

    return apply


def _ordered_pandas(df: DataFrame) -> pd.DataFrame:
    pdf = df.toPandas()
    if len(pdf) == 0:
        return pdf
    order = np.lexsort((pdf["s"].to_numpy(), pdf["p"].to_numpy()))
    return pdf.iloc[order]


class SparkStream:
    """An ordered line stream distributed over ``n_parts`` contiguous
    chunks, with a lazily-fused plan: pre-aggregate chunk functions, an
    optional deferred aggregator, and post-aggregate chunk functions."""

    def __init__(self, df: DataFrame, n_parts: int,
                 pending: Optional[List[ChunkFn]] = None,
                 aligned: bool = False,
                 agg: Optional[Tuple[AggFn, int]] = None,
                 post: Optional[List[ChunkFn]] = None):
        self.df = df
        self.n_parts = n_parts  # post-aggregate view: 1 when agg is set
        self.pending = pending or []
        self.aligned = aligned
        self.agg = agg  # (agg_fn, pre_agg_n_parts)
        self.post = post or []

    # -- constructors --------------------------------------------------------
    @staticmethod
    def from_lines(spark: SparkSession, lines: List[str], width: int = 1) -> "SparkStream":
        """Distribute ``lines`` pre-chunked into ``width`` contiguous chunks
        (static file chunking — no runtime split needed for file inputs)."""
        lines = list(lines)
        n = len(lines)
        width = max(1, min(width, n) if n else 1)
        spark.conf.set("spark.sql.execution.arrow.maxRecordsPerBatch", "250000")
        frames = [
            _chunk_pdf(k, lines[k * n // width : (k + 1) * n // width])
            for k in range(width)
        ]
        pdf = pd.concat(frames, ignore_index=True) if frames else _chunk_pdf(0, [])
        if len(pdf) == 0:
            return SparkStream(spark.createDataFrame([], schema=SCHEMA), width,
                               aligned=True)
        # exact-width range partitioning gives one whole chunk per task
        # (hash collides chunks onto one core; surplus hash buckets drown
        # in empty-task overhead). The persist matters: the range
        # partitioner's sampling job would otherwise re-run the driver-side
        # Arrow conversion once more per action.
        base = spark.createDataFrame(pdf, schema=SCHEMA).persist()
        df = base.repartitionByRange(width, "p")
        return SparkStream(df, width, aligned=True)

    # -- internal plan materialization ----------------------------------------
    def _pre_df(self) -> DataFrame:
        """The wide (pre-aggregate) stage as a DataFrame."""
        if not self.pending:
            return self.df
        pre_parts = self.agg[1] if self.agg else self.n_parts
        df = self.df if self.aligned else \
            self.df.repartitionByRange(max(pre_parts, 1), "p")
        return df.mapInPandas(_apply_chain(list(self.pending)), SCHEMA)

    def _materialized(self, rechunk_width: int = 1) -> DataFrame:
        """Materialize the whole plan. With a deferred aggregate, the
        aggregator (+post chain +re-chunk) runs as one single-partition
        task behind a stage boundary so the maps keep their width."""
        if self.agg is not None:
            agg_fn, pre_parts = self.agg
            return self._pre_df().repartition(1).mapInPandas(
                _agg_stage(agg_fn, pre_parts, list(self.post), rechunk_width),
                SCHEMA)
        assert not self.post
        return self._pre_df()

    def _mat_stream(self) -> "SparkStream":
        if not self.pending and self.agg is None:
            return self
        return SparkStream(self._materialized(), self.n_parts, aligned=True)

    # -- structural ops --------------------------------------------------------
    @staticmethod
    def cat(streams: List["SparkStream"]) -> "SparkStream":
        """Ordered concatenation: shift each stream's chunk ids by the
        total number of chunks before it (union preserves alignment)."""
        assert streams
        df = None
        off = 0
        aligned = True
        for st in streams:
            m = st._mat_stream()
            aligned = aligned and m.aligned
            part = m.df.select((F.col("p") + F.lit(off)).alias("p"), "s", "line")
            df = part if df is None else df.unionAll(part)
            off += st.n_parts
        return SparkStream(df, off, aligned=aligned)

    def split(self, width: int) -> "SparkStream":
        """Re-chunk into ``width`` contiguous pieces (PaSh split). Fused
        with a deferred aggregate when one is pending — PaSh's agg | split
        process pair in a single task."""
        if width <= 1:
            return self.coalesce1()
        if self.agg is not None or self.n_parts == 1:
            df = self._materialized(rechunk_width=width) if self.agg is not None \
                else self._pre_df().repartition(1).mapInPandas(_rechunk(width), SCHEMA)
            # persist: the consumer's range partitioner samples first, which
            # would otherwise recompute this single-task stage
            return SparkStream(df.persist(), width, aligned=False)
        mdf = self._materialized().persist()
        counts = {r["p"]: r["count"] for r in mdf.groupBy("p").count().collect()}
        total = sum(counts.values())
        if total == 0:
            return SparkStream(mdf.select(F.lit(0).alias("p"), "s", "line"), 1)
        offs: List[int] = []
        acc = 0
        for p in range(self.n_parts):
            offs.append(acc)
            acc += counts.get(p, 0)
        off_expr = F.element_at(
            F.create_map(*[F.lit(x) for pair in enumerate(offs) for x in pair]),
            F.col("p").cast("int"),
        )
        # chunk k = {g : floor(g*width/total) == k}, starting at
        # ceil(k*total/width) — start map must use the same boundaries
        bounds = [(k * total + width - 1) // width for k in range(width)]
        start_expr = F.element_at(
            F.create_map(*[F.lit(x) for pair in enumerate(bounds) for x in pair]),
            F.col("np").cast("int"),
        )
        df = (
            mdf.withColumn("g", off_expr + F.col("s"))
            .withColumn("np", F.floor(F.col("g") * width / total).cast("long"))
            .withColumn("np", F.least(F.col("np"), F.lit(width - 1)))
            .select(F.col("np").alias("p"), (F.col("g") - start_expr).alias("s"),
                    "line")
        )
        return SparkStream(df, width, aligned=False)

    def coalesce1(self) -> "SparkStream":
        """Merge all chunks into one (p=0), keeping order."""
        if self.agg is not None:
            return SparkStream(self._materialized(1), 1, aligned=True)
        st = self._mat_stream()
        df = st.df.repartition(1).mapInPandas(_rechunk(1), SCHEMA)
        return SparkStream(df, 1, aligned=True)

    # -- compute ops -----------------------------------------------------------
    def per_chunk(self, fn: ChunkFn) -> "SparkStream":
        """Run the black-box ``fn`` independently on every chunk — the n
        replicated nodes of transformation T. Lazy and fused."""
        if self.agg is not None:
            return SparkStream(self.df, self.n_parts, self.pending, self.aligned,
                               self.agg, self.post + [fn])
        return SparkStream(self.df, self.n_parts, self.pending + [fn], self.aligned)

    def aggregate(self, fn: AggFn) -> "SparkStream":
        """Collapse all chunks, in order, through an aggregator — PaSh's
        width-1 aggregate stage. Deferred: fuses with a following split or
        runs driver-side at a sink."""
        base = self._mat_stream() if self.agg is not None else self
        return SparkStream(base.df, 1, base.pending, base.aligned,
                           (fn, base.n_parts if base.agg is None else base.n_parts), [])

    def eager(self) -> "SparkStream":
        """Materialized buffer (§5 eager relay): persist the intermediate."""
        st = self._mat_stream()
        return SparkStream(st.df.persist(), st.n_parts, aligned=st.aligned)

    def collect_parts(self) -> List[List[str]]:
        """Collect the ordered chunks — the aggregator's input streams."""
        if self.agg is not None:
            return [self.collect_lines()]
        pdf = _ordered_pandas(self._pre_df())
        if len(pdf) == 0:
            return [[] for _ in range(self.n_parts)]
        lines = pdf["line"].tolist()
        ps = pdf["p"].to_numpy()
        bounds = np.searchsorted(ps, range(self.n_parts + 1))
        return [lines[bounds[p]: bounds[p + 1]] for p in range(self.n_parts)]

    # -- sinks -----------------------------------------------------------------
    def collect_lines(self) -> List[str]:
        if self.agg is not None:
            # run the deferred aggregator on the driver: one transfer of the
            # map outputs instead of an executor round-trip
            agg_fn, pre_parts = self.agg
            wide = SparkStream(self.df, pre_parts, self.pending, self.aligned)
            lines = agg_fn(wide.collect_parts())
            for f in self.post:
                lines = f(lines)
            return lines
        return _ordered_pandas(self._materialized())["line"].tolist()

    def count(self) -> int:
        return len(self.collect_lines()) if self.agg is not None \
            else self._materialized().count()
