"""Table 2 statistics: n, m, diameter, #components, largest component.

Counting columns (n, m, degree moments) are computed with Spark SQL so
the DuckDB oracle can cross-check them; component structure and
diameter come from the sequential reference BFS/union-find (the paper
itself computes these offline and reports lower bounds ``*`` where the
exact diameter was out of reach — we do the same above
``EXACT_DIAMETER_MAX_N`` vertices).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro import reference as ref
from repro.graphs.generators import GraphData

EXACT_DIAMETER_MAX_N = 5_000


@dataclass(frozen=True)
class GraphStats:
    name: str
    n: int
    m: int
    diameter: int
    diameter_exact: bool
    num_cc: int
    largest_cc: int

    def row(self) -> dict:
        star = "" if self.diameter_exact else "*"
        return {
            "Dataset": self.name,
            "n": self.n,
            "m": self.m,
            "Diam.": f"{self.diameter}{star}",
            "Num. CC": self.num_cc,
            "Largest CC": self.largest_cc,
        }


def spark_counts(spark: SparkSession, g: GraphData) -> tuple[int, int]:
    """(#vertices touched by edges ∪ isolated, #edges) via Spark SQL.

    m is the canonical edge count; n comes from the generator (isolated
    vertices carry no edges), but we verify the max id fits.
    """
    df = g.to_spark(spark)
    agg = df.agg(
        F.count(F.lit(1)).alias("m"), F.max(F.greatest("u", "v")).alias("max_id")
    ).collect()[0]
    if agg["max_id"] >= g.n:
        raise AssertionError("edge endpoint exceeds declared vertex count")
    return g.n, int(agg["m"])


def graph_stats(spark: SparkSession, g: GraphData) -> GraphStats:
    """Compute one Table 2 row for a generated graph."""
    n, m = spark_counts(spark, g)
    u, v = g.u(), g.v()
    labels = ref.connected_components(n, u, v)
    sizes = ref.component_sizes(labels)
    if n <= EXACT_DIAMETER_MAX_N:
        diam, exact = ref.exact_diameter(n, u, v), True
    else:
        diam, exact = ref.double_sweep_diameter(n, u, v), False
    return GraphStats(
        name=g.name or "?",
        n=n,
        m=m,
        diameter=diam,
        diameter_exact=exact,
        num_cc=len(sizes),
        largest_cc=int(sizes[0]),
    )
