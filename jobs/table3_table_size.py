"""§5.1 "Count table size" table: CC memory footprint / Motivo storage.

The paper compares CC's smallest viable JVM heap against Motivo's
external count-table bytes; we compare the block-manager resident size
of CC's cached tables against Motivo's parquet bytes. Reuses the runs
recorded by table2 when available (same builds), otherwise recomputes.

    spark-submit jobs/table3_table_size.py [--full]
"""
import os

import pandas as pd

from _common import RESULTS_DIR, emit, get_spark, quick_flag


def run(spark=None, quick: bool = True) -> pd.DataFrame:
    src = os.path.join(RESULTS_DIR, "table2_buildup_speedup.csv")
    if os.path.exists(src):
        base = pd.read_csv(src)
    else:
        import table2_buildup_speedup as t2

        base = t2.run(spark if spark is not None else get_spark("table3"), quick)
    return base[["graph", "k", "cc_mem_MB", "motivo_disk_MB", "size_ratio", "cc_status"]]


if __name__ == "__main__":
    emit("table3_table_size", run(None, quick_flag()))
