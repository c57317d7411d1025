"""Simulated distributed hash table (DHT).

The paper's AMPC implementations perform one shuffle that builds a
keyed representation of the graph (priority-directed adjacency for MIS,
edge-rank-sorted adjacency for matching, weight-sorted adjacency for
MSF, successor lists for cycles) and *write it to the key-value store*;
subsequent rounds make adaptive point lookups against it.

Here the "write to the KV store" is: run that one shuffle in Spark
(``groupBy``+``collect_list``), collect the result, and wrap it as a
read-only store that algorithms ship to executors with
``sparkContext.broadcast``. Within the following ``mapInPandas`` round
every task has random read access to every key — the defining AMPC
capability — without any further shuffle.

Query metering is done caller-side (a ``Meter`` per partition, reported
through output columns) so counts are exact and deterministic.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Any

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType, LongType, StructField, StructType

from repro.hashing import edge_rank, hash01
from repro.runtime import RoundContext

_WORD = 8  # bytes per id / weight, the model's "constant number of words"


@dataclass
class DHT:
    """A built, read-only key-value store plus its size accounting.

    ``store`` maps vertex id -> ``(neighbors, keys)`` numpy arrays
    (``keys`` is the per-neighbor sort key: rank or weight), or is any
    mapping the algorithm understands (e.g. raw successor arrays for
    cycles).
    """

    store: Any
    entries: int
    payload_bytes: int


class Meter:
    """Per-partition query counter — the AMPC communication meter.

    ``lookup`` counts a store read of ``words`` machine words;
    ``hit`` records a per-machine cache hit (no network in the model).
    """

    __slots__ = ("queries", "cache_hits", "kv_bytes")

    def __init__(self) -> None:
        self.queries = 0
        self.cache_hits = 0
        self.kv_bytes = 0

    def lookup(self, words: int = 1) -> None:
        self.queries += 1
        self.kv_bytes += words * _WORD

    def hit(self) -> None:
        self.cache_hits += 1


_SYM_SCHEMA = StructType(
    [
        StructField("src", LongType()),
        StructField("dst", LongType()),
        StructField("key", DoubleType()),
    ]
)


def _symmetric_with_key(edges: DataFrame, sort: str, seed: int) -> DataFrame:
    """Both orientations of each edge with the per-neighbor sort key.

    Narrow ops only (union + mapInPandas); the single shuffle happens in
    :func:`build_sorted_adjacency`'s groupBy.
    """
    cols = ["u", "v"] + (["w"] if "w" in edges.columns else [])
    fwd = edges.select(*cols)
    rev = edges.select(
        F.col("v").alias("u"), F.col("u").alias("v"), *(["w"] if "w" in cols else [])
    )
    sym = fwd.union(rev)

    def add_key(batches):
        for pdf in batches:
            src = pdf["u"].to_numpy()
            dst = pdf["v"].to_numpy()
            if sort == "vertex_rank":
                key = hash01(dst, seed)
            elif sort == "edge_rank":
                key = edge_rank(src, dst, seed)
            elif sort == "weight":
                key = pdf["w"].to_numpy().astype(np.float64)
            else:  # pragma: no cover
                raise ValueError(f"unknown sort mode {sort!r}")
            yield pd.DataFrame({"src": src, "dst": dst, "key": key})

    return sym.mapInPandas(add_key, schema=_SYM_SCHEMA)


def build_sorted_adjacency(
    spark: SparkSession,
    edges: DataFrame,
    ctx: RoundContext,
    *,
    sort: str = "vertex_rank",
    direct: bool = False,
    seed: int = 0,
) -> DHT:
    """The AMPC construction shuffle: adjacency lists sorted by ``sort``.

    - ``sort="vertex_rank"``: neighbors ordered by their rank π(v)
      (MIS, Figure 1 step 1).
    - ``sort="edge_rank"``: ordered by the rank of the connecting edge
      (maximal matching, §5.4).
    - ``sort="weight"``: ordered by edge weight (MSF Prim, §5.5) —
      ``edges`` must carry a ``w`` column.
    - ``direct=True`` keeps only neighbors earlier in the permutation
      (π(neighbor) < π(vertex)), i.e. the directed graph of Figure 1.

    Counts exactly one shuffle on ``ctx`` and records the KV payload
    size. Vertices with no (kept) neighbors are absent from the store;
    readers treat a miss as an empty list.
    """
    keyed = _symmetric_with_key(edges, sort, seed)
    if direct:
        if sort != "vertex_rank":
            raise ValueError("direct=True only makes sense with vertex_rank sort")

        def keep_earlier(batches):
            for pdf in batches:
                mask = pdf["key"].to_numpy() < hash01(pdf["src"].to_numpy(), seed)
                yield pdf[mask]

        keyed = keyed.mapInPandas(keep_earlier, schema=_SYM_SCHEMA)

    grouped = keyed.groupBy("src").agg(
        F.sort_array(F.collect_list(F.struct("key", "dst"))).alias("nbrs")
    )
    ctx.shuffle(1)  # the one costly round: Flume GroupByKey / Spark exchange
    rows = grouped.toPandas()

    store: dict[int, tuple[np.ndarray, np.ndarray]] = {}
    payload = 0
    for src, nbrs in zip(rows["src"].tolist(), rows["nbrs"].tolist()):
        keys = np.fromiter((x["key"] for x in nbrs), dtype=np.float64, count=len(nbrs))
        dsts = np.fromiter((x["dst"] for x in nbrs), dtype=np.int64, count=len(nbrs))
        store[int(src)] = (dsts, keys)
        payload += (2 * len(nbrs) + 1) * _WORD
    ctx.kv_bytes += payload
    return DHT(store=store, entries=len(store), payload_bytes=payload)


def build_cycle_store(
    spark: SparkSession, edges: DataFrame, n: int, ctx: RoundContext
) -> DHT:
    """Successor store for degree-2 graphs (the 1-vs-2-Cycle inputs).

    One shuffle groups both neighbors of every vertex; the store is a
    dense ``(n, 2)`` int64 array — the array-backed DHT of DESIGN.md §2
    (compact enough to broadcast even at 2×10^6 vertices).
    """
    sym = edges.select("u", "v").union(edges.select(F.col("v").alias("u"), F.col("u").alias("v")))
    # Degree-2 vertices have exactly two neighbors, so min/max capture
    # the full list — scalar aggregates transfer far faster than
    # collect_list arrays at 10^6-vertex scale.
    grouped = sym.groupBy("u").agg(
        F.min("v").alias("n1"), F.max("v").alias("n2"), F.count("v").alias("deg")
    )
    ctx.shuffle(1)
    rows = grouped.toPandas()
    if len(rows) != n or (rows["deg"].to_numpy() != 2).any():
        raise ValueError("cycle store needs every vertex to have degree 2")
    nbr = np.full((n, 2), -1, dtype=np.int64)
    src = rows["u"].to_numpy()
    nbr[src, 0] = rows["n1"].to_numpy()
    nbr[src, 1] = rows["n2"].to_numpy()
    payload = nbr.size * _WORD
    ctx.kv_bytes += payload
    return DHT(store=nbr, entries=n, payload_bytes=payload)
