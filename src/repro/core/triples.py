"""A Spark-DataFrame RDF-star triple store with named graphs (sub. S4).

The paper stores the LiDS graph in GraphDB and queries it with SPARQL.
Offline we keep the same data model — (graph, subject, predicate,
object, weight) quads where ``weight`` is the RDF-star edge annotation
(similarity / prediction scores) — in a Spark DataFrame, and answer
basic-graph-pattern (BGP) queries by chaining DataFrame joins, which is
what a SPARQL engine compiles a BGP to anyway. Every triple also carries
the Table-4 "modelled aspect" of its predicate for the graph-breakdown
accounting.

Schema: g, s, p, o: string · w: double (NaN = unannotated) · aspect: string
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from .ontology import ASPECT_OF_PREDICATE

TRIPLE_SCHEMA = T.StructType(
    [
        T.StructField("g", T.StringType(), False),
        T.StructField("s", T.StringType(), False),
        T.StructField("p", T.StringType(), False),
        T.StructField("o", T.StringType(), False),
        T.StructField("w", T.DoubleType(), True),
        T.StructField("aspect", T.StringType(), True),
    ]
)

DEFAULT_GRAPH = "http://kglids.org/graph/default"


@dataclass
class TripleBuilder:
    """Accumulates triples cheaply in Python before one createDataFrame."""

    graph: str = DEFAULT_GRAPH
    rows: list[tuple] = field(default_factory=list)

    def add(
        self,
        s: str,
        p: str,
        o: str,
        w: float | None = None,
        aspect: str | None = None,
        graph: str | None = None,
    ) -> None:
        if aspect is None:
            aspect = ASPECT_OF_PREDICATE.get(p, "other")
        self.rows.append(
            (graph or self.graph, str(s), str(p), str(o),
             float(w) if w is not None else math.nan, aspect)
        )

    def to_pandas(self) -> pd.DataFrame:
        return pd.DataFrame(self.rows, columns=["g", "s", "p", "o", "w", "aspect"])


class TripleStore:
    """LiDS-graph storage + BGP query over a Spark DataFrame of quads."""

    def __init__(self, spark: SparkSession, df: DataFrame):
        self.spark = spark
        self.df = df

    # ---------- construction ----------
    @classmethod
    def empty(cls, spark: SparkSession) -> "TripleStore":
        return cls(spark, spark.createDataFrame([], TRIPLE_SCHEMA))

    @classmethod
    def from_rows(cls, spark: SparkSession, rows: list[tuple]) -> "TripleStore":
        pdf = pd.DataFrame(rows, columns=["g", "s", "p", "o", "w", "aspect"])
        return cls.from_pandas(spark, pdf)

    @classmethod
    def from_pandas(cls, spark: SparkSession, pdf: pd.DataFrame) -> "TripleStore":
        if pdf.empty:
            return cls.empty(spark)
        pdf = pdf.astype(
            {"g": str, "s": str, "p": str, "o": str, "w": "float64", "aspect": str}
        )
        return cls(spark, spark.createDataFrame(pdf, TRIPLE_SCHEMA))

    def union(self, other: "TripleStore") -> "TripleStore":
        return TripleStore(self.spark, self.df.unionByName(other.df))

    def persist(self) -> "TripleStore":
        self.df = self.df.persist()
        self.df.count()  # materialize
        return self

    # ---------- statistics ----------
    def n_triples(self) -> int:
        return self.df.count()

    def n_unique_nodes(self) -> int:
        nodes = self.df.select(F.col("s").alias("n")).unionByName(
            self.df.select(F.col("o").alias("n"))
        )
        return nodes.distinct().count()

    def n_unique_predicates(self) -> int:
        return self.df.select("p").distinct().count()

    def ntriples_size_bytes(self) -> int:
        """Approximate serialized N-Quads size (Table 3 'Size')."""
        row = self.df.select(
            F.sum(
                F.length("s") + F.length("p") + F.length("o") + F.lit(10)
            ).alias("b")
        ).collect()[0]
        return int(row["b"] or 0)

    def aspect_breakdown(self) -> pd.DataFrame:
        """Triple counts per modelled aspect (Table 4)."""
        pdf = (
            self.df.groupBy("aspect")
            .agg(F.count("*").alias("n_triples"))
            .toPandas()
            .sort_values("n_triples", ascending=False)
            .reset_index(drop=True)
        )
        pdf["pct"] = 100.0 * pdf["n_triples"] / pdf["n_triples"].sum()
        return pdf

    # ---------- queries ----------
    def match(
        self,
        s: str | None = None,
        p: str | None = None,
        o: str | None = None,
        g: str | None = None,
    ) -> DataFrame:
        """Single triple-pattern match; None = wildcard."""
        out = self.df
        for col, val in (("s", s), ("p", p), ("o", o), ("g", g)):
            if val is not None:
                out = out.filter(F.col(col) == val)
        return out

    def match_bgp(self, patterns: list[tuple[str, str, str]]) -> DataFrame:
        """Conjunctive basic-graph-pattern query — the SPARQL substitute.

        Each pattern is (s, p, o); a term starting with '?' is a
        variable. Returns one column per variable. Joins are delegated
        to Catalyst, so multi-pattern queries run as ordinary Spark
        shuffle joins over the quad table.
        """
        if not patterns:
            raise ValueError("empty BGP")
        result: DataFrame | None = None
        for i, (s, p, o) in enumerate(patterns):
            part = self.df
            rename = {}
            for col, term in (("s", s), ("p", p), ("o", o)):
                if term.startswith("?"):
                    rename[col] = term[1:]
                else:
                    part = part.filter(F.col(col) == term)
            cols = [F.col(c).alias(v) for c, v in rename.items()]
            cols.append(F.col("w").alias(f"_w{i}"))
            part = part.select(*cols)
            if result is None:
                result = part
            else:
                shared = [c for c in part.columns if c in result.columns and not c.startswith("_w")]
                result = (
                    result.join(part, on=shared, how="inner")
                    if shared
                    else result.crossJoin(part)
                )
        assert result is not None
        var_cols = [c for c in result.columns if not c.startswith("_w")]
        return result.select(*var_cols, *[c for c in result.columns if c.startswith("_w")]).dropDuplicates(var_cols)
