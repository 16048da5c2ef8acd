"""Job: reproduce Table 6 (maximum h-club: direct solvers vs Algorithm 7)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _runner import emit, get_spark  # noqa: E402

from repro.tables import table6  # noqa: E402

if __name__ == "__main__":
    spark = get_spark("table6")
    emit("Table 6 - maximum h-club", table6.run(spark=spark))
    spark.stop()
