"""Spark-side graph plumbing (S4 in DESIGN.md).

Graphs live in NumPy CSR for the simulation kernels; this module is the
DataFrame bridge: edge tables, degree tables, and a DataFrame-native
weighted-cascade computation — each one a plain relational job that the
DuckDB oracle can verify (`tests/test_spark_io.py`).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.csr import CSRGraph


def edges_to_pdf(csr: CSRGraph, weights=None) -> pd.DataFrame:
    """Edge table as pandas: (eid, src, dst[, weight]) ordered by edge id."""
    pdf = pd.DataFrame(
        {
            "eid": range(csr.m),
            "src": csr.edge_sources(),
            "dst": csr.indices,
        }
    )
    if weights is not None:
        pdf["weight"] = weights
    return pdf


def edges_df(spark: SparkSession, csr: CSRGraph, weights=None) -> DataFrame:
    """Edge table as a Spark DataFrame: (eid, src, dst[, weight])."""
    return spark.createDataFrame(edges_to_pdf(csr, weights))


def nodes_df(spark: SparkSession, csr: CSRGraph) -> DataFrame:
    """Node table (node,) covering 0..n-1, including isolated nodes."""
    return spark.range(csr.n).withColumnRenamed("id", "node")


def degree_df(spark: SparkSession, csr: CSRGraph) -> DataFrame:
    """Per-node (node, out_degree, in_degree), zeros for isolated nodes.

    Pure DataFrame computation over the edge table (two aggregations and
    outer joins against the node table) — exercised against the DuckDB
    oracle rather than trusting the NumPy CSR degree methods.
    """
    e = edges_df(spark, csr)
    nodes = nodes_df(spark, csr)
    outd = e.groupBy(F.col("src").alias("node")).agg(F.count("*").alias("out_degree"))
    ind = e.groupBy(F.col("dst").alias("node")).agg(F.count("*").alias("in_degree"))
    return (
        nodes.join(outd, "node", "left")
        .join(ind, "node", "left")
        .select(
            "node",
            F.coalesce("out_degree", F.lit(0)).alias("out_degree"),
            F.coalesce("in_degree", F.lit(0)).alias("in_degree"),
        )
    )


def weighted_cascade_df(spark: SparkSession, csr: CSRGraph) -> DataFrame:
    """Weighted-cascade weights computed relationally: (eid, src, dst, weight).

    weight = 1 / in_degree(dst), via a groupBy on dst joined back to the
    edge table. Must agree exactly with
    :func:`repro.graphs.weights.weighted_cascade` (asserted in tests).
    """
    e = edges_df(spark, csr)
    ind = e.groupBy(F.col("dst").alias("_d")).agg(F.count("*").alias("in_degree"))
    return (
        e.join(ind, e.dst == ind._d)
        .select("eid", "src", "dst", (F.lit(1.0) / F.col("in_degree")).alias("weight"))
    )
