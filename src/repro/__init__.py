"""Reproduction of "Planting Trees for scalable and efficient Canonical
Hub Labeling" (Lakhotia et al., VLDB 2019) on PySpark. See DESIGN.md."""
