"""spark-submit entrypoint: QLOVE as a live Structured Streaming query.

Generates a NetMon-sim telemetry stream, drops it as parquet micro-batch
files into a spool directory, and runs the stateful QLOVE aggregation
(``applyInPandasWithState``) over it, printing one row per completed
128K-window with the estimated quantiles.

Usage: spark-submit jobs/streaming_demo.py [n_events]
"""
import sys
import tempfile
from pathlib import Path

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.fewk import FewKConfig
from repro.sparklayer.streaming import qlove_streaming
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon

SPEC = WindowSpec(size=131_072, period=16_384)
PHIS = (0.5, 0.9, 0.99, 0.999)


def main() -> None:
    n_events = int(sys.argv[1]) if len(sys.argv) > 1 else 524_288
    spark = SparkSession.builder.appName("qlove-streaming-demo").getOrCreate()
    try:
        spool = Path(tempfile.mkdtemp(prefix="qlove_stream_"))
        stream = netmon(n_events, seed=0)
        # one parquet file per sub-window = one micro-batch per period
        for s in range(n_events // SPEC.period):
            lo, hi = s * SPEC.period, (s + 1) * SPEC.period
            pd.DataFrame(
                {
                    "stream_id": "netmon",
                    "seq": np.arange(lo, hi, dtype=np.int64),
                    "value": stream[lo:hi],
                }
            ).to_parquet(spool / f"batch-{s:06d}.parquet")
        events = (
            spark.readStream.schema("stream_id STRING, seq BIGINT, value DOUBLE")
            .option("maxFilesPerTrigger", 1)
            .parquet(str(spool))
        )
        fewk = FewKConfig.from_fraction(
            window_size=SPEC.size,
            period=SPEC.period,
            phis=[0.999],
            sample_fraction=0.5,
            auto_topk=True,
        )
        out = qlove_streaming(events, SPEC, PHIS, sig_digits=3, fewk=fewk)
        query = (
            out.writeStream.format("console")
            .option("truncate", "false")
            .outputMode("append")
            .start()
        )
        query.processAllAvailable()
        query.stop()
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
