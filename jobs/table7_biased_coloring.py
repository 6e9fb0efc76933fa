"""§3.4 biased-coloring impact: build time / table size vs accuracy.

The paper (Friendster, 65M nodes): λ = 0.001 shrinks build time 1.7×
(k=5) to 7× (k=6) and memory/disk ≥ 2×, at a modest error increase
(Figure 6). Our reproduction: on the friendster analog, build with the
uniform coloring and with biased colorings at several λ, reporting
time, rows, bytes and — on the ESU-feasible amazon analog — the mean
|err_H| of naive-sampling estimates under each coloring.

    spark-submit jobs/table7_biased_coloring.py [--full]
"""
import shutil
import tempfile
import time

import numpy as np
import pandas as pd

from _common import emit, get_spark, quick_flag
from repro.core import buildup, estimators as est, sampler
from repro.exactcount import esu
from repro.graphs import datasets

# None = uniform. The paper uses λ=0.001 on a 65M-node graph; at 10⁴
# nodes λ must stay large enough that colorful copies survive at all
# (the λ-growing procedure of §3.4 bottoms out far higher at this n).
LAMBDAS = [None, 0.10, 0.05]


def run(spark, quick: bool = True) -> pd.DataFrame:
    rows = []
    # --- resource impact on the largest analog -------------------------
    big = datasets.load("friendster")
    ks = [4] if quick else [4, 5]
    for k in ks:
        base_time = None
        base_bytes = None
        for lam in LAMBDAS:
            flush = tempfile.mkdtemp(prefix="biased_")
            t0 = time.monotonic()
            tables = buildup.build_tables(spark, big, k, seed=505, lam=lam, flush_dir=flush)
            secs = time.monotonic() - t0
            if lam is None:
                base_time, base_bytes = secs, tables.stats.total_bytes
            rows.append(
                {
                    "graph": "friendster",
                    "k": k,
                    "lambda": "uniform" if lam is None else lam,
                    "build_s": round(secs, 1),
                    "rows": tables.stats.total_rows,
                    "disk_MB": round(tables.stats.total_bytes / 1e6, 2),
                    "time_speedup_vs_uniform": round(base_time / secs, 2),
                    "space_saving_vs_uniform": round(
                        base_bytes / max(tables.stats.total_bytes, 1), 2
                    ),
                    "mean_abs_err": float("nan"),
                }
            )
            shutil.rmtree(flush, ignore_errors=True)
            print(f"[table7] {rows[-1]}", flush=True)

    # --- accuracy impact where exact truth is computable ----------------
    small = datasets.load("amazon")
    k = 4
    truth = esu.esu_counts(spark, small, k)
    tot = sum(truth.values())
    frequent = {g: c for g, c in truth.items() if c / tot > 0.005}
    for lam in LAMBDAS:
        tables = buildup.build_tables(spark, small, k, seed=506, lam=lam)
        batch = sampler.sample_graphlets(spark, tables, 20_000, seed=51)
        estimates = est.naive_estimates(batch.hits, batch.n_samples, tables)
        errs = [abs(est.err_h(estimates.get(g, 0.0), c)) for g, c in frequent.items()]
        rows.append(
            {
                "graph": "amazon",
                "k": k,
                "lambda": "uniform" if lam is None else lam,
                "build_s": float("nan"),
                "rows": tables.stats.total_rows,
                "disk_MB": float("nan"),
                "time_speedup_vs_uniform": float("nan"),
                "space_saving_vs_uniform": float("nan"),
                "mean_abs_err": round(float(np.mean(errs)), 4),
            }
        )
        for df in tables.levels.values():
            df.unpersist()
        print(f"[table7] {rows[-1]}", flush=True)
    return pd.DataFrame(rows)


if __name__ == "__main__":
    emit("table7_biased_coloring", run(get_spark("table7"), quick_flag()))
