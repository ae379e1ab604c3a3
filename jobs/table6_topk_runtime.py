"""Reproduce Fig. 9 (as a table): pruning ratio vs runtime improvement."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import parser, prod_lake, session  # noqa: E402

from repro import experiments as X  # noqa: E402


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table6")
    tables = prod_lake(spark, args)
    rows = X.table6_topk_runtime(spark, tables, k=10)
    print("Table 6 — top-k pruning: scan-set reduction vs Spark runtime")
    print(X.format_table6(rows))
    spark.stop()


if __name__ == "__main__":
    main()
