"""Issuer Match blocking (paper Section 5.3.1, blocking 3 — securities only).

Given a previous *company* matching (an assignment of company records to
matched groups), two security records become a candidate pair when their
issuers landed in the same matched company group. This is what lets
securities with wiped identifiers (NoIdOverlaps) and generic names
("Equity Shares") be matched at all.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.metrics.pairs import canonical_pairs


def issuer_match(securities: DataFrame, company_groups: DataFrame) -> DataFrame:
    """Security candidate pairs whose issuers share a matched company group.

    ``company_groups``: (id, group) over company record ids — the output of
    the company entity group matching (or ground truth, in tests).
    """
    secs = securities.select("record_id", "source_id", "company_record_id")
    tagged = secs.join(
        company_groups.withColumnRenamed("id", "company_record_id"),
        "company_record_id",
    )
    a, b = tagged.alias("a"), tagged.alias("b")
    joined = a.join(b, "group").where(
        (F.col("a.record_id") != F.col("b.record_id"))
        & (F.col("a.source_id") != F.col("b.source_id"))
    )
    return canonical_pairs(joined.select(
        F.col("a.record_id").alias("src"), F.col("b.record_id").alias("dst")
    ))
