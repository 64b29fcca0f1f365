"""Print Table 3: the supervised-matching (DSM) dataset stats."""
from repro.harness import table3

if __name__ == "__main__":
    print(table3().to_string(index=False))
