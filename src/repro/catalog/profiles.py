"""Column profiling for joinability: MinHash signatures computed in Spark.

The paper's "Joinable" metadata provider (Fig. 2/3) surfaces a joinability
graph computed by some backend service. Our backend is built here:

* :func:`profile_columns` scans every physical dataset **once** and computes,
  per column, an approximate distinct count and a k-slot MinHash signature.
  Each signature slot ``i`` is ``min(xxhash64(value, i))`` over the column —
  all ``n_cols * (k+1)`` aggregates run in a single Catalyst aggregation per
  dataset, so the whole profile pass is one scan per dataset.
* :func:`estimate_joinability` cross-joins the (small) profile frame with
  itself and estimates, per compatible column pair, the Jaccard similarity
  (fraction of matching MinHash slots) and the containment
  ``|A ∩ B| / |A|`` via the standard identity
  ``|A ∩ B| = J/(1+J) * (|A| + |B|)``. Pure Catalyst expressions
  (``zip_with`` + ``aggregate``), no UDFs.
* :func:`exact_containment` computes ground-truth containment for *all*
  compatible cross-dataset pairs with one big self-join on distinct values —
  used by experiment E5 to score the MinHash estimates.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    DoubleType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from repro.lake import writer

DEFAULT_K = 64

#: Columns with fewer distinct values than this are excluded from
#: joinability (both estimation and ground truth): flag/enum columns are
#: trivially "contained" in any large column of the same type but make
#: meaningless join keys, and Jaccard-based containment estimation is
#: known-noisy when |A| << |B|. Aurum-style discovery systems apply the
#: same low-cardinality cut.
MIN_JOIN_KEY_DISTINCT = 10

#: Columns with these Spark types are hashed as join-key candidates.
_JOINABLE_SPARK_TYPES = {"bigint", "int", "smallint", "string", "date"}

PROFILE_SCHEMA = StructType(
    [
        StructField("dataset", StringType(), False),
        StructField("column", StringType(), False),
        StructField("dtype", StringType(), False),
        StructField("n_distinct", LongType(), False),
        StructField("minhash", ArrayType(LongType()), False),
    ]
)


def _joinable_columns(df: DataFrame) -> list[tuple[str, str]]:
    """(name, key-class) for columns eligible as join keys."""
    out = []
    for name, dtype in df.dtypes:
        if dtype in _JOINABLE_SPARK_TYPES:
            # Key class: integers join integers, strings join strings.
            cls = "int" if dtype in ("bigint", "int", "smallint") else "str"
            out.append((name, cls))
    return out


def profile_dataset(df: DataFrame, dataset: str, *, k: int = DEFAULT_K) -> list[tuple]:
    """Profile one dataset in a single aggregation pass; returns profile rows."""
    cols = _joinable_columns(df)
    if not cols:
        return []
    aggs = []
    for name, _cls in cols:
        s = F.col(name).cast("string")
        aggs.append(F.approx_count_distinct(name).alias(f"nd__{name}"))
        for i in range(k):
            aggs.append(
                F.min(F.xxhash64(s, F.lit(i))).alias(f"mh__{name}__{i}")
            )
    row = df.agg(*aggs).collect()[0].asDict()
    return [
        (
            dataset,
            name,
            cls,
            int(row[f"nd__{name}"] or 0),
            [int(row[f"mh__{name}__{i}"]) for i in range(k)]
            if row[f"mh__{name}__0"] is not None
            else [0] * k,
        )
        for name, cls in cols
    ]


def profile_columns(
    spark: SparkSession,
    lake_root: str,
    *,
    datasets: list[str] | None = None,
    k: int = DEFAULT_K,
) -> DataFrame:
    """Profile every dataset in the lake; returns the profile DataFrame."""
    names = datasets or writer.list_datasets(lake_root)
    rows: list[tuple] = []
    for name in names:
        df = writer.read_dataset(spark, lake_root, name)
        rows.extend(profile_dataset(df, name, k=k))
    return spark.createDataFrame(rows, PROFILE_SCHEMA)


def estimate_joinability(
    profiles: DataFrame,
    *,
    threshold: float = 0.5,
    k: int = DEFAULT_K,
    min_distinct: int = MIN_JOIN_KEY_DISTINCT,
) -> DataFrame:
    """Estimated joinability edges from MinHash profiles (Catalyst-only).

    Returns directed edges ``(src_dataset, src_column, dst_dataset,
    dst_column, jaccard_est, containment_est)`` with
    ``containment_est >= threshold``: the fraction of ``src``'s values
    estimated to also appear in ``dst``. Same-dataset pairs are excluded.
    """
    profiles = profiles.where(F.col("n_distinct") >= min_distinct)
    a = profiles.alias("a")
    b = profiles.alias("b")
    pairs = a.join(
        b,
        (F.col("a.dtype") == F.col("b.dtype"))
        & (F.col("a.dataset") != F.col("b.dataset")),
        "inner",
    )
    matches = F.aggregate(
        F.zip_with(
            F.col("a.minhash"),
            F.col("b.minhash"),
            lambda x, y: (x == y).cast("int"),
        ),
        F.lit(0),
        lambda acc, v: acc + v,
    )
    j = (matches.cast("double") / F.lit(float(k))).alias("jaccard_est")
    out = pairs.select(
        F.col("a.dataset").alias("src_dataset"),
        F.col("a.column").alias("src_column"),
        F.col("b.dataset").alias("dst_dataset"),
        F.col("b.column").alias("dst_column"),
        j,
        F.col("a.n_distinct").alias("src_nd"),
        F.col("b.n_distinct").alias("dst_nd"),
    )
    inter = (
        F.col("jaccard_est")
        / (F.lit(1.0) + F.col("jaccard_est"))
        * (F.col("src_nd") + F.col("dst_nd"))
    )
    out = out.withColumn(
        "containment_est",
        F.least(F.lit(1.0), inter / F.greatest(F.col("src_nd"), F.lit(1).cast("long"))),
    )
    return out.where(F.col("containment_est") >= threshold).select(
        "src_dataset",
        "src_column",
        "dst_dataset",
        "dst_column",
        "jaccard_est",
        "containment_est",
    )


def exact_containment(
    spark: SparkSession,
    lake_root: str,
    *,
    datasets: list[str] | None = None,
    min_distinct: int = MIN_JOIN_KEY_DISTINCT,
) -> DataFrame:
    """Ground-truth containment for all compatible cross-dataset column pairs.

    Builds one long frame of distinct ``(dataset, column, key-class, value)``
    tuples across the lake, self-joins on value, and aggregates intersection
    sizes — one shuffle computes every pair at once. Returns
    ``(src_dataset, src_column, dst_dataset, dst_column, containment)``.
    """
    names = datasets or writer.list_datasets(lake_root)
    parts: list[DataFrame] = []
    for name in names:
        df = writer.read_dataset(spark, lake_root, name)
        for col, cls in _joinable_columns(df):
            parts.append(
                df.select(
                    F.lit(name).alias("dataset"),
                    F.lit(col).alias("column"),
                    F.lit(cls).alias("cls"),
                    F.col(col).cast("string").alias("value"),
                ).distinct()
            )
    if not parts:
        raise ValueError(f"no joinable columns found in lake {lake_root}")
    longdf = parts[0]
    for p in parts[1:]:
        longdf = longdf.unionByName(p)
    longdf = longdf.where(F.col("value").isNotNull())
    sizes = longdf.groupBy("dataset", "column").agg(
        F.count("*").alias("n_distinct")
    )
    # Same low-cardinality cut as the estimator, so ground truth and
    # estimates score over the same candidate universe.
    keyworthy = sizes.where(F.col("n_distinct") >= min_distinct).select(
        "dataset", "column"
    )
    longdf = longdf.join(keyworthy, ["dataset", "column"], "inner")
    a = longdf.alias("a")
    b = longdf.alias("b")
    inter = (
        a.join(
            b,
            (F.col("a.value") == F.col("b.value"))
            & (F.col("a.cls") == F.col("b.cls"))
            & (F.col("a.dataset") != F.col("b.dataset")),
        )
        .groupBy(
            F.col("a.dataset").alias("src_dataset"),
            F.col("a.column").alias("src_column"),
            F.col("b.dataset").alias("dst_dataset"),
            F.col("b.column").alias("dst_column"),
        )
        .agg(F.count("*").alias("n_inter"))
    )
    return (
        inter.join(
            sizes.withColumnRenamed("dataset", "src_dataset").withColumnRenamed(
                "column", "src_column"
            ),
            ["src_dataset", "src_column"],
        )
        .select(
            "src_dataset",
            "src_column",
            "dst_dataset",
            "dst_column",
            (F.col("n_inter").cast("double") / F.col("n_distinct")).alias(
                "containment"
            ),
        )
    )
