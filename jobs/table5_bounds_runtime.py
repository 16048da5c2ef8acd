"""Job: reproduce Table 5 (effect of each bound on running time)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _runner import emit, get_spark  # noqa: E402

from repro.tables import table5  # noqa: E402

if __name__ == "__main__":
    spark = get_spark("table5")
    emit("Table 5 - effect of bounds on runtime", table5.run(spark=spark))
    spark.stop()
