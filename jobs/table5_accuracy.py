"""§5.2 accuracy reproduction: ℓ1 error and graphlets within ±50%.

Reproduces the quoted §5.2 numbers ("ℓ1 error below 5% in all cases,
below 2.5% for k ≤ 7"; "over 90% of graphlets within ±50% for k = 6
...") as a table: for each ESU-feasible analog, exact ground truth vs
naive sampling and vs AGS at the same budget — per-row: ℓ1 error, the
number and fraction of classes within ±50% (Figure 9's metric).

    spark-submit jobs/table5_accuracy.py [--full]
"""
import pandas as pd

from _common import emit, get_spark, quick_flag
from repro.core import ags, buildup, estimators as est, sampler
from repro.exactcount import esu
from repro.graphs import datasets

# facebook's BA hubs make exact ESU ground truth ~200s/run, so quick
# mode sticks to the ESU-cheap analogs; --full adds facebook and k=5.
GRID_QUICK = [("amazon", 4), ("dblp", 4), ("yelp", 4)]
GRID_FULL = GRID_QUICK + [("facebook", 4), ("amazon", 5), ("dblp", 5)]

BUDGET = 30_000


def run(spark, quick: bool = True) -> pd.DataFrame:
    rows = []
    for name, k in (GRID_QUICK if quick else GRID_FULL):
        g = datasets.load(name)
        truth = esu.esu_counts(spark, g, k)
        tables = buildup.build_tables(spark, g, k, seed=303)
        naive = sampler.sample_graphlets(spark, tables, BUDGET, seed=31)
        naive_est = est.naive_estimates(naive.hits, naive.n_samples, tables)
        adaptive = ags.ags(
            spark, tables, cbar=1000, batch_size=3000, max_samples=BUDGET, seed=32
        )
        for algo, estimates in [("naive", naive_est), ("ags", adaptive.estimates)]:
            rows.append(
                {
                    "graph": name,
                    "k": k,
                    "algo": algo,
                    "classes_truth": len(truth),
                    "l1_error": round(est.l1_error(estimates, truth), 4),
                    "n_within50": est.n_within(estimates, truth, 0.5),
                    "frac_within50": round(est.frac_within(estimates, truth, 0.5), 3),
                    "l2_norm": round(est.l2_norm(truth), 4),
                }
            )
            print(f"[table5] {rows[-1]}", flush=True)
        for df in tables.levels.values():
            df.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    emit("table5_accuracy", run(get_spark("table5"), quick_flag()))
