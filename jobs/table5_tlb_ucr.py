"""Table V: mean TLB on the UCR-like suite per alphabet size."""
from _common import emit, get_spark

from repro.experiments.tables import table5

if __name__ == "__main__":
    spark = get_spark("table5")
    emit("Table V — mean TLB on UCR-like datasets", table5(spark))
    spark.stop()
