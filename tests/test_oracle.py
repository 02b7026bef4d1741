"""Tests for the DuckDB oracle itself — the checker must both accept
equivalent results at any magnitude and reject genuinely wrong ones."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import _canon, _round_sig, assert_equivalent


def test_round_sig_small_values():
    s = pd.Series([1.2345678901234, 0.000123456789])
    out = _round_sig(s, sig=6)
    assert out[0] == pytest.approx(1.23457)
    assert out[1] == pytest.approx(0.000123457)


def test_round_sig_preserves_large_integers():
    # The motivating regression: 7.6e11 must not become ...64.9999.
    v = 758956300365.0
    assert _round_sig(pd.Series([v]))[0] == v
    big = 2170076351018.0
    assert abs(_round_sig(pd.Series([big]))[0] - big) <= 10


def test_round_sig_handles_zero_nan_negative():
    s = pd.Series([0.0, np.nan, -12345.6789])
    out = _round_sig(s, sig=6)
    assert out[0] == 0.0
    assert np.isnan(out[1])
    assert out[2] == pytest.approx(-12345.7, rel=1e-6)


def test_canon_sorts_rows_and_columns():
    a = pd.DataFrame({"b": [2, 1], "a": [20, 10]})
    b = pd.DataFrame({"a": [10, 20], "b": [1, 2]})
    pd.testing.assert_frame_equal(_canon(a), _canon(b))


def test_assert_equivalent_accepts_matching(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": [1.5, 2.5]}))
    assert_equivalent(
        df.groupBy("k").sum("v").withColumnRenamed("sum(v)", "s"),
        "SELECT k, sum(v) AS s FROM t GROUP BY k",
        t=pd.DataFrame({"k": [1, 2], "v": [1.5, 2.5]}),
    )


def test_assert_equivalent_rejects_wrong_values(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1], "s": [999.0]}))
    with pytest.raises(AssertionError):
        assert_equivalent(
            df,
            "SELECT k, sum(v) AS s FROM t GROUP BY k",
            t=pd.DataFrame({"k": [1], "v": [1.0]}),
        )


def test_assert_equivalent_rejects_column_mismatch(spark):
    df = spark.createDataFrame(pd.DataFrame({"k": [1], "wrong_name": [1.0]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(
            df,
            "SELECT k, sum(v) AS s FROM t GROUP BY k",
            t=pd.DataFrame({"k": [1], "v": [1.0]}),
        )
