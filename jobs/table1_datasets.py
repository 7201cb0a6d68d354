"""Table I: the 17 benchmark datasets and their synthetic analogs."""
from _common import emit

from repro.experiments.tables import table1

if __name__ == "__main__":
    emit("Table I — dataset characteristics (paper vs repro tier)", table1())
