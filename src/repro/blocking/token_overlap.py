"""Token Overlap blocking (paper Section 5.3.1, blocking 2).

Each record is tokenized (lower-cased name + city, punctuation stripped);
candidate pairs are, per record, the top-n records from *other* data
sources with the most overlapping tokens. A document-frequency cap drops
ubiquitous tokens (corporate suffixes like "inc", "ltd") that would
otherwise create a quadratic token-join blowup without carrying matching
signal — the collision-prone mid-frequency terms ("energy", "networks")
that drive the paper's false positives stay below the cap.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.metrics.pairs import canonical_pairs


def tokenize(records: DataFrame, text_cols: tuple = ("name", "city")) -> DataFrame:
    """(record_id, source_id, token) — distinct tokens of length >= 3."""
    text = F.concat_ws(" ", *[F.coalesce(F.col(c), F.lit("")) for c in text_cols])
    return (
        records.select(
            "record_id", "source_id",
            F.explode(
                F.split(F.regexp_replace(F.lower(text), r"[^a-z0-9 ]", " "), r"\s+")
            ).alias("token"),
        )
        .where(F.length("token") >= 3)
        .distinct()
    )


def token_overlap(records: DataFrame, n_top: int = 5,
                  max_df_frac: float = 0.05, min_df_cap: int = 50,
                  text_cols: tuple = ("name", "city")) -> DataFrame:
    """Candidate pairs (src, dst) from top-n token overlap across sources."""
    toks = tokenize(records, text_cols)
    n_records = records.count()
    cap = max(min_df_cap, int(n_records * max_df_frac))
    rare = (
        toks.groupBy("token").agg(F.count("*").alias("df"))
        .where(F.col("df") <= cap)
        .select("token")
    )
    toks = toks.join(rare, "token")
    a, b = toks.alias("a"), toks.alias("b")
    overlaps = (
        a.join(b, "token")
        .where(
            (F.col("a.record_id") != F.col("b.record_id"))
            & (F.col("a.source_id") != F.col("b.source_id"))
        )
        .groupBy(
            F.col("a.record_id").alias("ra"), F.col("b.record_id").alias("rb")
        )
        .agg(F.count("*").alias("overlap"))
    )
    w = Window.partitionBy("ra").orderBy(F.desc("overlap"), F.asc("rb"))
    top = overlaps.withColumn("rank", F.row_number().over(w)).where(
        F.col("rank") <= n_top
    )
    return canonical_pairs(top, "ra", "rb")
