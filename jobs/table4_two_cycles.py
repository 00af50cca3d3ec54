"""spark-submit entrypoint reproducing Table IV (TDB++ cover size with vs
without 2-cycles, k=5).

Usage: ``python jobs/table4_two_cycles.py [DATASET ...]``
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark  # noqa: E402

from repro.tables.table4 import run_table4  # noqa: E402


def main() -> None:
    spark = get_spark("table4")
    datasets = sys.argv[1:] or None
    emit(run_table4(spark, datasets=datasets), "table4")
    spark.stop()


if __name__ == "__main__":
    main()
