"""spark-submit entrypoint reproducing Table 6 (see repro.eval.experiments.table6_seed_propagation)."""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import emit, get_spark, parse_args

from repro.eval.experiments import build_all_artifacts, table6_seed_propagation


def main() -> None:
    args = parse_args(__doc__)
    spark = get_spark("table6")
    artifacts = build_all_artifacts(spark, scale=args.scale, seed=args.seed)
    emit(table6_seed_propagation(artifacts), "Table 6")


if __name__ == "__main__":
    main()
