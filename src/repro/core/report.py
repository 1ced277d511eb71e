"""Render benchmark outputs in the paper's table layouts.

`table15_markdown` reproduces Table 15's structure: for each error
type, the Q1-Q5 flag-share blocks over R1/R2/R3. Individual markdown
helpers avoid a dependency on `tabulate`.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.cleaning.registry import ERROR_TYPES
from repro.core.queries import (
    QUERIES,
    applicable,
    flag_shares,
    group_attr,
    run_query,
)

RELATIONS = ("R1", "R2", "R3")


def markdown_table(pdf: pd.DataFrame) -> str:
    """Minimal GitHub-markdown renderer for a pandas frame."""
    cols = list(pdf.columns)
    lines = ["| " + " | ".join(str(c) for c in cols) + " |"]
    lines.append("|" + "|".join("---" for _ in cols) + "|")
    for _, row in pdf.iterrows():
        lines.append("| " + " | ".join(str(v) for v in row) + " |")
    return "\n".join(lines)


def query_block(
    spark: SparkSession, query: str, error_type: str
) -> pd.DataFrame | None:
    """One Table 15 block: flag shares per relation for one query."""
    frames = []
    for rel in RELATIONS:
        if not applicable(query, rel, error_type):
            continue
        counts = run_query(spark, query, rel, error_type).toPandas()
        if counts.empty:
            continue
        shares = flag_shares(counts, group_attr(query))
        shares.insert(0, "R", rel)
        frames.append(shares)
    if not frames:
        return None
    return pd.concat(frames, ignore_index=True)


def table15_markdown(spark: SparkSession, error_types=ERROR_TYPES) -> str:
    """The full Table 15 report over registered relation views."""
    out = ["# Table 15 — Benchmark Results (organized by query)\n"]
    for e in error_types:
        for q in QUERIES:
            block = query_block(spark, q, e)
            if block is None:
                continue
            out.append(f"\n## {q} (E={e})\n")
            out.append(markdown_table(block))
    return "\n".join(out) + "\n"
