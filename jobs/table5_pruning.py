"""spark-submit entrypoint reproducing Table 5 (see repro.eval.experiments.table5_pruning)."""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import emit, get_spark, parse_args

from repro.eval.experiments import build_all_artifacts, table5_pruning


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("table5")
    artifacts = build_all_artifacts(spark, scale=args.scale, seed=args.seed)
    emit(table5_pruning(artifacts), "Table 5")


if __name__ == "__main__":
    main()
