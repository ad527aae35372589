"""Tests for DistState construction, pre-aggregation and finalize."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.engine.aggspec import sum_spec
from repro.engine.state import finalize, make_state, preaggregate

SPEC = sum_spec("a", "b", key_out="a", out="sum_b")


@pytest.fixture(scope="module")
def df(spark):
    return spark.createDataFrame(
        pd.DataFrame(
            {
                "frag": [0, 0, 1, 1, 2],
                "a": [1, 1, 1, 2, 3],
                "b": [10, 20, 5, 7, 9],
            }
        )
    )


class TestMakeState:
    def test_all_to_one_single_partition(self, df):
        st = make_state(df, SPEC, n_frags=3, mode="all_to_one", dest_frag=1)
        assert st.n_parts == 1
        np.testing.assert_array_equal(st.dest, [1])
        parts = {r["part"] for r in st.df.select("part").distinct().collect()}
        assert parts == {0}

    def test_all_to_all_balanced_dest(self, df):
        st = make_state(df, SPEC, n_frags=3, mode="all_to_all")
        np.testing.assert_array_equal(st.dest, [0, 1, 2])
        parts = {r["part"] for r in st.df.select("part").distinct().collect()}
        assert parts <= {0, 1, 2}

    def test_all_to_all_custom_parts(self, df):
        st = make_state(df, SPEC, n_frags=3, mode="all_to_all", n_parts=5)
        np.testing.assert_array_equal(st.dest, [0, 1, 2, 0, 1])

    def test_custom_partitioner(self, df):
        part = F.when(F.col("a") <= 1, 0).otherwise(1)
        st = make_state(
            df, SPEC, n_frags=3, mode="all_to_all", n_parts=2, partitioner=part
        )
        rows = st.df.select("key", "part").distinct().collect()
        for r in rows:
            assert r["part"] == (0 if r["key"] <= 1 else 1)

    def test_partials_initialised(self, df):
        st = make_state(df, SPEC, n_frags=3, mode="all_to_one")
        assert set(st.df.columns) == {"frag", "part", "key", "p_sum"}

    def test_bad_mode(self, df):
        with pytest.raises(ValueError):
            make_state(df, SPEC, n_frags=3, mode="ring")

    def test_bad_dest(self, df):
        with pytest.raises(ValueError):
            make_state(df, SPEC, n_frags=3, mode="all_to_one", dest_frag=9)


class TestPreaggregate:
    def test_local_merge(self, df):
        st = preaggregate(make_state(df, SPEC, n_frags=3, mode="all_to_one"))
        rows = {
            (r["frag"], r["key"]): r["p_sum"] for r in st.df.collect()
        }
        assert rows[(0, 1)] == 30  # 10 + 20 merged locally
        assert rows[(1, 1)] == 5  # not merged across fragments
        assert st.preaggregated

    def test_idempotent(self, df):
        st = preaggregate(make_state(df, SPEC, n_frags=3, mode="all_to_one"))
        again = preaggregate(st)
        assert again is st

    def test_preserves_total(self, df):
        st0 = make_state(df, SPEC, n_frags=3, mode="all_to_one")
        st1 = preaggregate(st0)
        total0 = st0.df.agg(F.sum("p_sum")).collect()[0][0]
        total1 = st1.df.agg(F.sum("p_sum")).collect()[0][0]
        assert total0 == total1


class TestFinalize:
    def test_output_columns_and_values(self, df):
        st = make_state(df, SPEC, n_frags=3, mode="all_to_one")
        # Pretend everything already reached fragment 0.
        moved = st.df.withColumn("frag", F.lit(0))
        out = finalize(st.with_df(moved))
        got = {r["a"]: r["sum_b"] for r in out.collect()}
        assert got == {1: 35, 2: 7, 3: 9}
