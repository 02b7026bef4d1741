"""DuckDB correctness oracle.

``assert_equivalent(spark_df, sql, **tables)`` runs ``sql`` in DuckDB
over ``tables`` and asserts the sorted rows match ``spark_df`` (the
Spark result). This catches wrong results from a rewritten plan or a
custom operator — "it ran" is not "it is correct".

``tables`` may be Spark or pandas DataFrames; Spark inputs are
collected via ``.toPandas()``. Alias every output column identically
on both sides (Spark names ``count(*)`` as ``count(1)``, DuckDB as
``count_star()``) and project to scalar columns — array/map/struct
columns are not orderable so cannot be compared here.
"""
import duckdb
import pandas as pd
from pyspark.sql import DataFrame


def _round_sig(a: pd.Series, sig: int = 12) -> pd.Series:
    """Round to ``sig`` significant digits, scale-aware.

    Plain ``round(x, 6)`` internally scales by 1e6, which destroys the
    low bits of large magnitudes (e.g. a 7.6e11 epoch-seconds SUM ends
    up at ...64.9999 on one side only and the diff fails spuriously).
    Significant-digit rounding canonicalizes fp noise at every scale.
    """
    import numpy as np

    x = a.to_numpy(dtype="float64", copy=True)
    nz = np.isfinite(x) & (x != 0)
    exp = np.zeros_like(x)
    exp[nz] = np.floor(np.log10(np.abs(x[nz])))
    scale = 10.0 ** np.clip(sig - 1 - exp, -18, 18)
    x[nz] = np.round(x[nz] * scale[nz]) / scale[nz]
    return pd.Series(x, index=a.index, name=a.name)


def _canon(pdf: pd.DataFrame) -> pd.DataFrame:
    # Canonical column order first, then row order by those columns, so
    # two results that differ only in projection order compare equal.
    pdf = pdf[sorted(pdf.columns)].reset_index(drop=True).copy()
    for c in pdf.select_dtypes(include=["float", "float64"]).columns:
        pdf[c] = _round_sig(pdf[c])
    return pdf.sort_values(list(pdf.columns)).reset_index(drop=True)


def assert_equivalent(spark_df: DataFrame, sql: str, **tables) -> None:
    con = duckdb.connect()
    try:
        for name, t in tables.items():
            con.register(name, t.toPandas() if isinstance(t, DataFrame) else t)
        expected = con.execute(sql).fetchdf()
    finally:
        con.close()
    got = spark_df.toPandas()
    assert set(expected.columns) == set(got.columns), (
        f"column mismatch: {sorted(got.columns)} vs {sorted(expected.columns)} "
        "— alias every output column identically on both sides"
    )
    # check_exact=False everywhere: DuckDB surfaces exact integer results
    # (e.g. HUGEINT sums) as float64 while Spark keeps int64, and an
    # int-vs-float column would otherwise be compared bit-exactly. The
    # rounding in _canon stabilizes sort order; rtol guards values.
    pd.testing.assert_frame_equal(
        _canon(got), _canon(expected), check_dtype=False,
        check_exact=False, rtol=1e-9, atol=1e-8,
    )
