"""spark-submit entrypoint reproducing Table 3 (see repro.eval.experiments.table3_real_workers)."""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import emit, get_spark, parse_args

from repro.eval.experiments import build_all_artifacts, table3_real_workers


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("table3")
    artifacts = build_all_artifacts(spark, scale=args.scale, seed=args.seed)
    emit(table3_real_workers(artifacts), "Table 3")


if __name__ == "__main__":
    main()
