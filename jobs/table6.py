"""spark-submit entrypoint for Table 6 (TWCS vs KGEval)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _session import get_session  # noqa: E402

from repro.tables import table6  # noqa: E402

if __name__ == "__main__":
    spark = get_session("table6")
    rows = table6.compute(spark)
    print(table6.table_text(rows))
    spark.stop()
