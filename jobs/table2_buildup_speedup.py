"""§5.1 "Build-up time" table: Motivo's build-up speedup over CC.

For each (graph, k) in the comparison grid, runs both build-ups on the
same coloring and reports wall-clock times, the speedup ratio, table
sizes (Motivo parquet bytes vs CC's resident cached bytes — consumed by
table3), and a CC status column: ``-`` reproduces the paper's dashes
when CC would fail (64-bit counter overflow detected from the Motivo
decimal tables).

    spark-submit jobs/table2_buildup_speedup.py [--full]
"""
import shutil
import tempfile
import time

import pandas as pd

from _common import emit, get_spark, quick_flag
from repro.core import baseline, buildup
from repro.graphs import datasets

#: (graph, k) grid; quick mode covers every CC-comparison graph at k=4
#: and the smaller half at k=5 (the paper's grid is k=5..9, shrunk to
#: our scale — see DESIGN.md §3).
GRID_QUICK = [(g, 4) for g in datasets.CC_COMPARISON_GRAPHS] + [
    ("facebook", 5),
    ("amazon", 5),
    ("dblp", 5),
    ("yelp", 5),
]
GRID_FULL = GRID_QUICK + [("berkstan", 5), ("livejournal", 5), ("orkut", 5), ("facebook", 6)]


def run(spark, quick: bool = True) -> pd.DataFrame:
    rows = []
    for name, k in (GRID_QUICK if quick else GRID_FULL):
        g = datasets.load(name)
        flush = tempfile.mkdtemp(prefix=f"motivo_{name}_{k}_")
        t0 = time.monotonic()
        tables = buildup.build_tables(spark, g, k, seed=101, flush_dir=flush)
        motivo_s = time.monotonic() - t0
        overflow = baseline.check_overflow_risk(tables)
        cc_s = float("nan")
        cc_mem = float("nan")
        status = "-"
        if not overflow:
            t0 = time.monotonic()
            levels, _, _ = baseline.build_tables_cc(spark, g, k, seed=101)
            cc_s = time.monotonic() - t0
            cc_mem = baseline.cached_table_bytes(spark)
            for df in levels.values():
                df.unpersist()
            status = "ok"
        rows.append(
            {
                "graph": name,
                "k": k,
                "motivo_s": round(motivo_s, 1),
                "cc_s": round(cc_s, 1),
                "speedup": round(cc_s / motivo_s, 2),
                "motivo_disk_MB": round(tables.stats.total_bytes / 1e6, 2),
                "cc_mem_MB": round(cc_mem / 1e6, 2),
                "size_ratio": round(cc_mem / max(tables.stats.total_bytes, 1), 2),
                "cc_status": status,
            }
        )
        shutil.rmtree(flush, ignore_errors=True)
        print(f"[table2] {rows[-1]}", flush=True)
    return pd.DataFrame(rows)


if __name__ == "__main__":
    emit("table2_buildup_speedup", run(get_spark("table2"), quick_flag()))
