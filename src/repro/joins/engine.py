"""Engine abstraction: the same relational dynamic programs on Spark or pandas.

Every algorithm in :mod:`repro.joins` is written once against this small
protocol. ``SparkEngine`` is the production path (DataFrame API / Catalyst);
``LocalEngine`` mirrors it on pandas so the DP *logic* can be unit-tested in
milliseconds and cross-checked against the Spark results.
"""
from __future__ import annotations

from abc import ABC, abstractmethod
from typing import Mapping, Sequence

import numpy as np
import pandas as pd


class Engine(ABC):
    """Minimal relational operations needed by the Yannakakis-style DPs."""

    @abstractmethod
    def columns(self, df) -> list[str]:
        """Column names of ``df``."""

    @abstractmethod
    def project(self, df, cols: Sequence[str], distinct: bool = False):
        """SELECT cols [DISTINCT]."""

    @abstractmethod
    def filter_range(self, df, col: str, lo: float, hi: float, right_closed: bool = True):
        """WHERE lo <= col <= hi (closed, the paper's boxes) or lo <= col < hi
        (half-open — grid cells, so adjacent cells never double-count)."""

    @abstractmethod
    def join(self, a, b, on: Sequence[str], how: str = "inner"):
        """Equi-join on shared column names; ``b`` must only add new columns."""

    @abstractmethod
    def semijoin(self, a, b, on: Sequence[str]):
        """Tuples of ``a`` with at least one match in ``b`` (left-semi join)."""

    @abstractmethod
    def groupby_sum(self, df, keys: Sequence[str], col: str, out: str):
        """SELECT keys, SUM(col) AS out GROUP BY keys."""

    @abstractmethod
    def with_lit(self, df, col: str, value):
        """Add a constant column."""

    @abstractmethod
    def multiply_into(self, df, target: str, factor: str):
        """target := target * factor, dropping ``factor``."""

    @abstractmethod
    def rename(self, df, mapping: Mapping[str, str]):
        """Rename columns."""

    @abstractmethod
    def to_pandas(self, df) -> pd.DataFrame:
        """Collect to pandas (only for small/bounded results)."""

    @abstractmethod
    def from_pandas(self, pdf: pd.DataFrame):
        """Create an engine-native frame from pandas."""

    @abstractmethod
    def add_row_id(self, df, col: str):
        """Attach a deterministic, unique row id column."""

    @abstractmethod
    def sum_col(self, df, col: str) -> float:
        """SUM(col) over all rows (0.0 for an empty frame)."""

    @abstractmethod
    def count(self, df) -> int:
        """Number of rows."""

    @abstractmethod
    def minmax(self, df, cols: Sequence[str]) -> dict[str, tuple[float, float]]:
        """Per-column (min, max); NaN bounds for an empty frame."""

    @abstractmethod
    def cache(self, df):
        """Mark for reuse (no-op on pandas)."""

    @abstractmethod
    def weighted_pick(
        self,
        tuples_df,
        key_cols: Sequence[str],
        weight_col: str,
        requests: pd.DataFrame,
        out_cols: Sequence[str],
    ) -> pd.DataFrame:
        """Per-request weighted sampling within a join-key group.

        ``requests`` is a pandas frame with columns ``key_cols + ['__sid',
        '__u']`` (``__u`` uniform in [0,1)). For each request, among the
        tuples of ``tuples_df`` whose key columns match, pick one tuple with
        probability proportional to ``weight_col`` using ``__u`` (inverse-CDF).
        Returns pandas ``['__sid'] + out_cols``. This is the top-down step of
        uniform sampling over join results (Zhao et al. style).
        """

    @abstractmethod
    def assign_nearest(self, df, cols: Sequence[str], centers: np.ndarray, out: str):
        """Add column ``out`` = index of nearest center (Euclidean) over ``cols``."""


def _pick_rows(
    grp: pd.DataFrame, reqs: pd.DataFrame, weight_col: str, out_cols: Sequence[str]
) -> pd.DataFrame:
    """Inverse-CDF pick of one ``grp`` row per ``reqs`` row (shared key group)."""
    w = grp[weight_col].to_numpy(dtype=np.float64)
    cum = np.cumsum(w)
    total = cum[-1]
    idx = np.searchsorted(cum, reqs["__u"].to_numpy(dtype=np.float64) * total, side="right")
    idx = np.minimum(idx, len(grp) - 1)
    out = grp.iloc[idx][list(out_cols)].reset_index(drop=True)
    out.insert(0, "__sid", reqs["__sid"].to_numpy())
    return out


class LocalEngine(Engine):
    """pandas implementation — for fast unit tests and Spark cross-checks."""

    def columns(self, df):
        return list(df.columns)

    def project(self, df, cols, distinct=False):
        out = df[list(cols)]
        return out.drop_duplicates().reset_index(drop=True) if distinct else out.copy()

    def filter_range(self, df, col, lo, hi, right_closed=True):
        upper = df[col] <= hi if right_closed else df[col] < hi
        return df[(df[col] >= lo) & upper].reset_index(drop=True)

    def join(self, a, b, on, how="inner"):
        return a.merge(b, on=list(on), how=how)

    def semijoin(self, a, b, on):
        keys = b[list(on)].drop_duplicates()
        return a.merge(keys, on=list(on), how="inner").reset_index(drop=True)

    def groupby_sum(self, df, keys, col, out):
        if len(df) == 0:
            return pd.DataFrame(columns=[*keys, out])
        g = df.groupby(list(keys), as_index=False)[col].sum()
        return g.rename(columns={col: out})

    def with_lit(self, df, col, value):
        out = df.copy()
        out[col] = value
        return out

    def multiply_into(self, df, target, factor):
        out = df.copy()
        out[target] = out[target] * out[factor]
        return out.drop(columns=[factor])

    def rename(self, df, mapping):
        return df.rename(columns=dict(mapping))

    def to_pandas(self, df):
        return df.reset_index(drop=True)

    def from_pandas(self, pdf):
        return pdf.copy()

    def add_row_id(self, df, col):
        out = df.sort_values(list(df.columns), kind="mergesort").reset_index(drop=True)
        out[col] = np.arange(len(out), dtype=np.int64)
        return out

    def sum_col(self, df, col):
        return float(df[col].sum()) if len(df) else 0.0

    def count(self, df):
        return int(len(df))

    def minmax(self, df, cols):
        return {c: (float(df[c].min()), float(df[c].max())) for c in cols}

    def cache(self, df):
        return df

    def weighted_pick(self, tuples_df, key_cols, weight_col, requests, out_cols):
        if len(requests) == 0 or len(tuples_df) == 0:
            return pd.DataFrame(columns=["__sid", *out_cols])
        key_cols = list(key_cols)
        pieces = []
        groups = dict(iter(tuples_df.groupby(key_cols)))
        for key, reqs in requests.groupby(key_cols):
            grp = groups.get(key)
            if grp is None:
                continue
            pieces.append(_pick_rows(grp, reqs, weight_col, out_cols))
        if not pieces:
            return pd.DataFrame(columns=["__sid", *out_cols])
        return pd.concat(pieces, ignore_index=True)

    def assign_nearest(self, df, cols, centers, out):
        res = df.copy()
        if len(df) == 0:
            res[out] = pd.Series(dtype=np.int64)
            return res
        P = df[list(cols)].to_numpy(dtype=np.float64)
        d = ((P[:, None, :] - np.asarray(centers, dtype=np.float64)[None]) ** 2).sum(-1)
        res[out] = d.argmin(axis=1).astype(np.int64)
        return res


class SparkEngine(Engine):
    """PySpark DataFrame implementation (the production path)."""

    def __init__(self, spark):
        self.spark = spark

    def columns(self, df):
        return list(df.columns)

    def project(self, df, cols, distinct=False):
        out = df.select(*cols)
        return out.distinct() if distinct else out

    def filter_range(self, df, col, lo, hi, right_closed=True):
        from pyspark.sql import functions as F

        upper = F.col(col) <= float(hi) if right_closed else F.col(col) < float(hi)
        return df.where((F.col(col) >= float(lo)) & upper)

    def join(self, a, b, on, how="inner"):
        return a.join(b, on=list(on), how=how)

    def semijoin(self, a, b, on):
        return a.join(b.select(*on).distinct(), on=list(on), how="left_semi")

    def groupby_sum(self, df, keys, col, out):
        from pyspark.sql import functions as F

        return df.groupBy(*keys).agg(F.sum(col).alias(out))

    def with_lit(self, df, col, value):
        from pyspark.sql import functions as F

        return df.withColumn(col, F.lit(value))

    def multiply_into(self, df, target, factor):
        from pyspark.sql import functions as F

        return df.withColumn(target, F.col(target) * F.col(factor)).drop(factor)

    def rename(self, df, mapping):
        for old, new in mapping.items():
            df = df.withColumnRenamed(old, new)
        return df

    def to_pandas(self, df):
        return df.toPandas()

    def from_pandas(self, pdf):
        return self.spark.createDataFrame(pdf)

    def add_row_id(self, df, col):
        from pyspark.sql import Window
        from pyspark.sql import functions as F

        # row_number over a total order on all columns: deterministic ids, at
        # the cost of a single-partition sort — fine at reproduction scales
        # and required so id->tuple stays stable across Spark actions.
        w = Window.orderBy(*[F.col(c) for c in df.columns])
        return df.withColumn(col, (F.row_number().over(w) - 1).cast("long"))

    def sum_col(self, df, col):
        from pyspark.sql import functions as F

        row = df.agg(F.sum(col).alias("s")).collect()[0]
        return float(row["s"]) if row["s"] is not None else 0.0

    def count(self, df):
        return int(df.count())

    def minmax(self, df, cols):
        from pyspark.sql import functions as F

        aggs = []
        for c in cols:
            aggs += [F.min(c).alias(f"__mn_{c}"), F.max(c).alias(f"__mx_{c}")]
        row = df.agg(*aggs).collect()[0]
        return {
            c: (
                float(row[f"__mn_{c}"]) if row[f"__mn_{c}"] is not None else float("nan"),
                float(row[f"__mx_{c}"]) if row[f"__mx_{c}"] is not None else float("nan"),
            )
            for c in cols
        }

    def cache(self, df):
        return df.cache()

    def weighted_pick(self, tuples_df, key_cols, weight_col, requests, out_cols):
        import pyspark.sql.types as T

        if len(requests) == 0:
            return pd.DataFrame(columns=["__sid", *out_cols])
        key_cols = list(key_cols)
        out_cols = list(out_cols)
        weight = weight_col
        # Align request key dtypes with the Spark side before createDataFrame.
        reqs_sdf = self.from_pandas(requests[[*key_cols, "__sid", "__u"]])
        for kc in key_cols:
            reqs_sdf = reqs_sdf.withColumn(kc, reqs_sdf[kc].cast(tuples_df.schema[kc].dataType))
        right = tuples_df.select(*key_cols, weight, *[c for c in out_cols if c not in key_cols])
        schema = T.StructType(
            [T.StructField("__sid", T.LongType())]
            + [right.schema[c] for c in out_cols]
        )

        def pick(left: pd.DataFrame, grp: pd.DataFrame) -> pd.DataFrame:
            if len(left) == 0 or len(grp) == 0:
                return pd.DataFrame(columns=["__sid", *out_cols])
            return _pick_rows(grp, left, weight, out_cols)

        res = (
            reqs_sdf.groupBy(*key_cols)
            .cogroup(right.groupBy(*key_cols))
            .applyInPandas(pick, schema=schema)
        )
        return res.toPandas()

    def assign_nearest(self, df, cols, centers, out):
        from pyspark.sql import functions as F

        c = np.asarray(centers, dtype=np.float64)

        @F.pandas_udf("long")
        def _nearest(*series: pd.Series) -> pd.Series:
            P = np.column_stack([s.to_numpy(dtype=np.float64) for s in series])
            d = ((P[:, None, :] - c[None]) ** 2).sum(-1)
            return pd.Series(d.argmin(axis=1))

        return df.withColumn(out, _nearest(*[F.col(x) for x in cols]))
