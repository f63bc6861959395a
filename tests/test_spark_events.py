"""Spark tests: event streams + value compression (sparklayer/events.py)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.compression import quantize_sig
from repro.oracle import assert_equivalent
from repro.sparklayer.events import with_quantized_value, with_sub_id
from repro.synth_data import netmon, telemetry_events


@pytest.fixture(scope="module")
def events(spark):
    return telemetry_events(spark, netmon(4_000, seed=0)).cache()


class TestWithSubId:
    def test_matches_oracle(self, spark, events):
        df = with_sub_id(events, 500).groupBy("sub_id").agg(
            F.count(F.lit(1)).alias("n")
        )
        assert_equivalent(
            df,
            """
            SELECT CAST(FLOOR(seq / 500) AS BIGINT) AS sub_id, COUNT(*) AS n
            FROM events GROUP BY 1
            """,
            events=events,
        )

    def test_invalid_period(self, events):
        with pytest.raises(ValueError):
            with_sub_id(events, 0)

    def test_sub_id_count(self, events):
        n = with_sub_id(events, 1_000).select("sub_id").distinct().count()
        assert n == 4


class TestQuantizedValue:
    def test_matches_kernel(self, spark, events):
        got = (
            with_quantized_value(events, 3)
            .orderBy("seq")
            .select("value")
            .toPandas()["value"]
            .to_numpy()
        )
        raw = events.orderBy("seq").select("value").toPandas()["value"].to_numpy()
        np.testing.assert_allclose(got, quantize_sig(raw, 3), rtol=1e-12)

    def test_none_is_identity(self, events):
        assert with_quantized_value(events, None) is events

    def test_invalid_digits(self, events):
        with pytest.raises(ValueError):
            with_quantized_value(events, 0)

    def test_reduces_distinct(self, events):
        raw = events.select("value").distinct().count()
        quant = with_quantized_value(events, 2).select("value").distinct().count()
        assert quant < raw

    def test_zero_and_negative(self, spark):
        import pandas as pd

        df = spark.createDataFrame(
            pd.DataFrame({"seq": [0, 1, 2], "value": [0.0, -74_265.0, 74_265.0]})
        )
        got = (
            with_quantized_value(df, 3).orderBy("seq").toPandas()["value"].tolist()
        )
        assert got == pytest.approx([0.0, -74_200.0, 74_200.0])
