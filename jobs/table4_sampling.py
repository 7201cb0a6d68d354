"""Table IV: SOFA performance vs MCB sampling rate."""
from _common import emit, get_spark

from repro.experiments.tables import table4

if __name__ == "__main__":
    spark = get_spark("table4")
    emit("Table IV — SOFA query times vs sampling rate (36 cores)",
         table4(spark))
    spark.stop()
