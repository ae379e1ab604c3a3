"""Reproduce Table 1: relative frequency of LIMIT-query types."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import parser, prod_lake, session  # noqa: E402

from repro import experiments as X  # noqa: E402


def main() -> None:
    args = parser(__doc__).parse_args()
    spark = session("table1")
    tables = prod_lake(spark, args)
    ours = X.table1_workload_mix(
        tables, n=args.n or 20_000, seed=args.seed
    )
    print("Table 1 — LIMIT-query type frequencies (% of SELECT queries)")
    print(X.format_table1(ours))
    spark.stop()


if __name__ == "__main__":
    main()
