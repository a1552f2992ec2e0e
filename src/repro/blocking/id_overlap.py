"""ID Overlap blocking (paper Section 5.3.1, blocking 1).

Securities: candidate pairs are security records across different sources
sharing any identifier *value* (ISIN/CUSIP/VALOR/SEDOL — values are matched
across identifier fields too: the paper's Figure 2 shows drifted records
where a CUSIP value shows up in another source's ISIN column).

Companies: a company pair is a candidate when any security issued by one
shares an identifier value with any security issued by the other — the
benchmark heuristic used for financial records.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.metrics.pairs import canonical_pairs

ID_COLS = ("isin", "cusip", "valor", "sedol")


def melt_ids(securities: DataFrame) -> DataFrame:
    """(record_id, source_id, company_record_id, id_value), non-empty only."""
    pairs = F.array(*[
        F.struct(F.lit(c).alias("id_type"), F.col(c).alias("id_value"))
        for c in ID_COLS
    ])
    return (
        securities.select(
            "record_id", "source_id", "company_record_id",
            F.explode(pairs).alias("kv"),
        )
        .select("record_id", "source_id", "company_record_id",
                F.col("kv.id_value").alias("id_value"))
        .where(F.col("id_value") != "")
        .distinct()
    )


def id_overlap_securities(securities: DataFrame) -> DataFrame:
    """Security candidate pairs (src, dst) sharing an identifier value."""
    ids = melt_ids(securities)
    a, b = ids.alias("a"), ids.alias("b")
    joined = a.join(b, "id_value").where(
        (F.col("a.record_id") != F.col("b.record_id"))
        & (F.col("a.source_id") != F.col("b.source_id"))
    )
    return canonical_pairs(joined.select(
        F.col("a.record_id").alias("src"), F.col("b.record_id").alias("dst")
    ))


def id_overlap_companies(companies: DataFrame, securities: DataFrame) -> DataFrame:
    """Company candidate pairs whose issued securities share an identifier."""
    ids = melt_ids(securities)
    a, b = ids.alias("a"), ids.alias("b")
    joined = a.join(b, "id_value").where(
        (F.col("a.company_record_id") != F.col("b.company_record_id"))
        & (F.col("a.source_id") != F.col("b.source_id"))
    )
    pairs = canonical_pairs(joined.select(
        F.col("a.company_record_id").alias("src"),
        F.col("b.company_record_id").alias("dst"),
    ))
    # Keep only pairs whose endpoints are actual company records (a security
    # may reference an issuer record missing from the company table).
    recs = companies.select(F.col("record_id"))
    return (
        pairs.join(recs.withColumnRenamed("record_id", "src"), "src")
        .join(recs.withColumnRenamed("record_id", "dst"), "dst")
    )
