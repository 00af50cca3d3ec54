"""spark-submit entrypoint reproducing Table III (cover size + runtime,
k=5, DARC-DV vs BUR+ vs TDB++; baselines DNF on the large tier).

Usage: ``python jobs/table3_cover.py [DATASET ...]``
Env: ``TABLE3_K`` (default 5), ``TABLE3_BASELINE_BUDGET`` /
``TABLE3_TDB_BUDGET`` (edge-traversal op budgets).

Rows are appended to ``results/table3_k5_rows.csv`` as they finish (a
long run that dies keeps its completed rows; rerun the missing datasets
and the final table is assembled from the row file), and the merged
table is rewritten to ``results/table3_k5.csv`` after every row.
"""
import os
import sys
import traceback
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import RESULTS, emit, get_spark  # noqa: E402

import pandas as pd  # noqa: E402

from repro.graphgen.registry import DATASETS  # noqa: E402
from repro.tables.table3 import run_table3  # noqa: E402


def main() -> None:
    spark = get_spark("table3")
    datasets = sys.argv[1:] or list(DATASETS)
    k = int(os.environ.get("TABLE3_K", "5"))
    budgets = {}
    if b := os.environ.get("TABLE3_BASELINE_BUDGET"):
        budgets["darc-dv"] = budgets["bur+"] = int(float(b))
    if b := os.environ.get("TABLE3_TDB_BUDGET"):
        budgets["tdb++"] = int(float(b))
    RESULTS.mkdir(exist_ok=True)
    rows_path = RESULTS / f"table3_k{k}_rows.csv"
    for name in datasets:
        try:
            row = run_table3(spark, k=k, datasets=[name], budgets=budgets)
        except Exception:
            print(f"[table3] {name} FAILED:", file=sys.stderr)
            traceback.print_exc()
            continue
        header = not rows_path.exists()
        row.to_csv(rows_path, mode="a", header=header, index=False)
        print(row.to_string(index=False))
        # keep the merged table current (last row per dataset wins)
        merged = (pd.read_csv(rows_path)
                  .drop_duplicates("dataset", keep="last"))
        merged.to_csv(RESULTS / f"table3_k{k}.csv", index=False)
    emit(pd.read_csv(RESULTS / f"table3_k{k}.csv"), f"table3_k{k}")
    spark.stop()


if __name__ == "__main__":
    main()
