"""Run every table job sequentially (bench scale); writes results/*.md."""
from __future__ import annotations

import table2
import table3
import table4
import table5
import table6
import table7


def main() -> None:
    table2.main("bench")
    table3.main("bench")
    table4.main("bench")
    table5.main()
    table6.main()
    table7.main("bench")


if __name__ == "__main__":
    main()
