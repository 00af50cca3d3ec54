"""spark-submit entrypoint reproducing Table II (dataset statistics).

Usage: ``python jobs/table2_stats.py [DATASET ...]``
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark  # noqa: E402

from repro.tables.table2 import run_table2  # noqa: E402


def main() -> None:
    spark = get_spark("table2")
    datasets = sys.argv[1:] or None
    emit(run_table2(spark, datasets), "table2")
    spark.stop()


if __name__ == "__main__":
    main()
