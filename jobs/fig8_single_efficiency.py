"""Fig 8 reproduction: single-task efficiency (Approx vs Approx*).

Run: ``spark-submit jobs/fig8_single_efficiency.py`` or plain python.
"""
from repro.experiments import (
    fig8a, fig8b, fig8c, fig8d, fig8e, fig8f, fig8g, fig8h,
)


def main() -> None:
    for name, fn in [
        ("8(a) time vs m", fig8a),
        ("8(b) time vs |W|", fig8b),
        ("8(c) cost breakdown", fig8c),
        ("8(d) pruning ratio", fig8d),
        ("8(e) tree time vs t_s", fig8e),
        ("8(f) time vs distribution", fig8f),
        ("8(g) time vs k", fig8g),
        ("8(h) time vs budget", fig8h),
    ]:
        print(f"\n== Fig {name} ==")
        print(fn().to_string(index=False))


if __name__ == "__main__":
    main()
