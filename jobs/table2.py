"""Print Table 2 (the 38 configuration parameters)."""
from repro.experiments import table2

if __name__ == "__main__":
    print(table2.run().to_string(index=False))
