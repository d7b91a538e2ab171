"""Triple-table representation of an RDF graph.

All engines in this repo consume an RDF graph as a Spark DataFrame with
the canonical schema ``(s string, p string, o string)`` — IRIs in
prefixed form (``wsdbm:User3``), literals as their lexical value. The
graph is a *set* of triples: :func:`canonicalize` dedupes on load, as
any RDF store does.
"""
from __future__ import annotations

import re

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

TRIPLE_SCHEMA = T.StructType(
    [
        T.StructField("s", T.StringType(), False),
        T.StructField("p", T.StringType(), False),
        T.StructField("o", T.StringType(), False),
    ]
)

_UNSAFE = re.compile(r"[^A-Za-z0-9_]")


def safe_name(predicate: str) -> str:
    """Column/directory-safe encoding of a predicate IRI.

    ``wsdbm:likes`` → ``wsdbm__likes``; bijective over the WatDiv
    vocabulary (no predicate contains ``__`` or other punctuation).
    """
    return _UNSAFE.sub("__", predicate)


def to_spark(spark: SparkSession, triples_pd: pd.DataFrame) -> DataFrame:
    """Lift a pandas ``(s,p,o)`` frame to Spark with the canonical schema."""
    return spark.createDataFrame(triples_pd[["s", "p", "o"]], schema=TRIPLE_SCHEMA)


def canonicalize(triples: DataFrame) -> DataFrame:
    """Project to the canonical column order and drop duplicate triples."""
    return triples.select("s", "p", "o").dropDuplicates(["s", "p", "o"])


def predicates(triples: DataFrame) -> list[str]:
    """The distinct predicates of the graph, sorted for determinism."""
    return sorted(r["p"] for r in triples.select("p").distinct().collect())
