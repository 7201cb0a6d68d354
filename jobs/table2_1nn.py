"""Table II: exact 1-NN query times per method x cores, plus the
Figure-12-style per-dataset SOFA-vs-MESSI speedups and the FAISS scale
crossover that explains the small-N inversion (see EXPERIMENTS.md)."""
from _common import emit, get_spark

from repro.experiments.local_bench import local_engine_times
from repro.experiments.tables import (ALL_DATASETS, faiss_crossover, table2,
                                      table2_scaled)

if __name__ == "__main__":
    spark = get_spark("table2")
    summary, detail = table2(spark)
    emit("Table II — 1-NN query times in ms (median/mean over 17 datasets)",
         summary)
    speed = (detail[detail.cores == 18].pivot(index="dataset",
                                              columns="method", values="ms"))
    speed["SOFA_speedup_vs_MESSI"] = (speed["MESSI"] / speed["SOFA"]).round(2)
    emit("Per-dataset (18 cores -> 8 partitions), Fig. 12 analog",
         speed.round(2).reset_index())
    loc = local_engine_times(ALL_DATASETS)
    emit("Engine-level per-query ms + pruning ratio (driver-local, "
         "overhead-free)", loc)
    agg = (loc.pivot(index="dataset", columns="method", values="ms")
           .agg(["mean", "median"]).round(2))
    emit("Engine-level aggregate over 17 datasets", agg.reset_index())
    emit("Table II at paper-like per-partition scale (N=160k, 16 partitions)",
         table2_scaled(spark))
    emit("FAISS crossover (ms/query vs N)", faiss_crossover(spark))
    spark.stop()
