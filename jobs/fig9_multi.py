"""Fig 9 reproduction: multi-task assignment (MSQM parallelization, MMQM).

Run: ``spark-submit jobs/fig9_multi.py``.
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.experiments import (  # noqa: E402
    fig7, fig9a, fig9b, fig9c, fig9d, fig9e, fig9f, fig9g, fig9h,
)


def main() -> None:
    spark = get_spark("fig9-multi")
    spark.sparkContext.setLogLevel("ERROR")
    print("\n== Fig 7: multi-task quality (Approx vs Rand) ==")
    print(fig7().to_string(index=False))
    for name, fn in [
        ("9(a) method vs parallelism", fig9a),
        ("9(b) parallel methods vs distribution", fig9b),
        ("9(c) worker conflicts vs |T|", fig9c),
        ("9(d) time vs |T|", fig9d),
        ("9(e) time vs m", fig9e),
        ("9(f) priority on/off", fig9f),
    ]:
        print(f"\n== Fig {name} ==")
        print(fn(spark).to_string(index=False))
    for name, fn in [("9(g) MMQM time vs |T|", fig9g),
                     ("9(h) MMQM time vs m", fig9h)]:
        print(f"\n== Fig {name} ==")
        print(fn().to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
