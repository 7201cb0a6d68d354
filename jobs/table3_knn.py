"""Table III: median k-NN query times (36 cores -> 16 partitions)."""
from _common import emit, get_spark

from repro.experiments.local_bench import local_knn_sweep
from repro.experiments.tables import ALL_DATASETS, table3

if __name__ == "__main__":
    spark = get_spark("table3")
    emit("Table III — median k-NN query times in ms (36 cores)", table3(spark))
    emit("Table III, engine level (driver-local, median over 17 datasets)",
         local_knn_sweep(ALL_DATASETS))
    spark.stop()
