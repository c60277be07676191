"""Fig 11 reproduction: spatiotemporal interpolation (STCC / SApprox).

Run: ``spark-submit jobs/fig11_stcc.py`` or plain python.
"""
from repro.experiments import fig11


def main() -> None:
    tables = fig11()
    for key, df in tables.items():
        print(f"\n== {key} ==")
        print(df.to_string(index=False))


if __name__ == "__main__":
    main()
