"""Table VI: mean TLB on the 17 SOFA dataset analogs per alphabet size."""
from _common import emit, get_spark

from repro.experiments.tables import table6

if __name__ == "__main__":
    spark = get_spark("table6")
    emit("Table VI — mean TLB on SOFA datasets", table6(spark))
    spark.stop()
