"""spark-submit entrypoint for the technique-speedup sweep (the paper's
Fig. 10 as a table): TDB vs TDB+ vs TDB++ on WKV/WGO, k = 3..7.

Usage: ``python jobs/speedup.py [DATASET ...]``
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark  # noqa: E402

from repro.tables.speedup import run_speedup  # noqa: E402


def main() -> None:
    spark = get_spark("speedup")
    if sys.argv[1:]:
        df = run_speedup(spark, datasets=tuple(sys.argv[1:]))
    else:
        import pandas as pd
        small = run_speedup(spark, datasets=("WKV", "WGO"))
        # the scale where the block technique separates from plain TDB
        large = run_speedup(spark, datasets=("FLK",), ks=(5,))
        df = pd.concat([small, large], ignore_index=True)
    emit(df, "speedup")
    spark.stop()


if __name__ == "__main__":
    main()
