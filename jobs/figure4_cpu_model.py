"""Fig 4: relative compute performance vs function memory and thread count.

Usage: python jobs/figure4_cpu_model.py
"""
from _common import print_table

from repro.faas import cpu_model


def main() -> None:
    rows = []
    for m in (128, 512, 1024, 1792, 2048, 2560, 3008):
        rows.append(
            {
                "memory_mib": m,
                "one_thread": cpu_model.relative_performance(m, 1),
                "two_threads": cpu_model.relative_performance(m, 2),
            }
        )
    print_table(rows, "Fig 4: relative compute performance (1792 MiB / 1 thread = 1.0)")
    print("paper: proportional below 1792 MiB; 1 thread capped at 1.0; 2 threads reach 1.67x at 3008 MiB")


if __name__ == "__main__":
    main()
