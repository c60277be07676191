"""Fig 6 reproduction: single-task quality (OPT / Approx / Rand).

Run: ``spark-submit jobs/fig6_single_quality.py`` (Spark is only needed for
session parity; the single-task solvers are driver-side).
"""
from repro.experiments import fig6a, fig6b


def main() -> None:
    print("== Fig 6(a): quality by task-location distribution ==")
    print(fig6a().to_string(index=False))
    print("\n== Fig 6(b): quality vs budget fraction ==")
    print(fig6b().to_string(index=False))


if __name__ == "__main__":
    main()
