"""spark-submit entrypoint reproducing Table 2 (see repro.eval.experiments.table2_datasets)."""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import emit, get_spark, parse_args

from repro.eval.experiments import build_all_artifacts, table2_datasets


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("table2")
    artifacts = build_all_artifacts(spark, scale=args.scale, seed=args.seed)
    emit(table2_datasets(artifacts), "Table 2")


if __name__ == "__main__":
    main()
