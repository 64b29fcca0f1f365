"""Print Table 2(a) (Clean-Clean) and 2(b) (Dirty-ER) dataset stats."""
import sys

from repro.harness import table2a, table2b

if __name__ == "__main__":
    if "--dirty" in sys.argv:
        print(table2b().to_string(index=False))
    else:
        print(table2a().to_string(index=False))
