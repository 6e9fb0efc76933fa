"""§5.3 reproduction: AGS vs naive sampling on skewed vs flat graphs.

The paper's headline (Yelp, k = 8): naive sampling finds only the star;
AGS returns accurate counts for ~87% of classes and reaches graphlets
with frequency < 1e-21 (Figure 10). Scaled to our analogs: per (graph,
k, algo) — classes witnessed, classes witnessed ≥ 10 times, frequency
of the rarest class seen ≥ 10 times, and classes within ±50% of exact
ESU truth. Skewed graphs (yelp, berkstan; ℓ2 ≈ 1) should show AGS far
ahead; flat graphs (facebook, dblp) should show naive slightly ahead —
the paper's own caveat.

    spark-submit jobs/table6_ags_vs_naive.py [--full]
"""
import pandas as pd

from _common import emit, get_spark, quick_flag
from repro.core import ags, buildup, estimators as est, sampler
from repro.exactcount import esu
from repro.graphs import datasets

# yelp = the skewed headline graph; dblp/amazon = the flat counterpoint.
# (berkstan's 1200-degree hub makes exact ESU infeasible at any scale —
# its skewed-sampling behaviour is exercised in tables 2/4 instead.)
GRID_QUICK = [("yelp", 4), ("dblp", 4), ("amazon", 4)]
GRID_FULL = GRID_QUICK + [("facebook", 4)]

BUDGET = 30_000


def run(spark, quick: bool = True) -> pd.DataFrame:
    rows = []
    for name, k in (GRID_QUICK if quick else GRID_FULL):
        g = datasets.load(name)
        truth = esu.esu_counts(spark, g, k)
        tables = buildup.build_tables(spark, g, k, seed=404)
        naive = sampler.sample_graphlets(spark, tables, BUDGET, seed=41)
        naive_est = est.naive_estimates(naive.hits, naive.n_samples, tables)
        adaptive = ags.ags(
            spark, tables, cbar=1000, batch_size=3000, max_samples=BUDGET, seed=42
        )
        for algo, hits, estimates in [
            ("naive", naive.hits, naive_est),
            ("ags", adaptive.hits, adaptive.estimates),
        ]:
            rows.append(
                {
                    "graph": name,
                    "k": k,
                    "algo": algo,
                    "l2_norm": round(est.l2_norm(truth), 4),
                    "classes_truth": len(truth),
                    "classes_seen": len(hits),
                    "classes_seen10": sum(1 for x in hits.values() if x >= 10),
                    "rarest_freq_seen10": est.rarest_found(hits, truth, 10),
                    "n_within50": est.n_within(estimates, truth, 0.5),
                }
            )
            print(f"[table6] {rows[-1]}", flush=True)
        for df in tables.levels.values():
            df.unpersist()
    return pd.DataFrame(rows)


if __name__ == "__main__":
    emit("table6_ags_vs_naive", run(get_spark("table6"), quick_flag()))
