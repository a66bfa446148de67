"""PySpark embedding: batch runner + Spark-SQL ground truth + Structured
Streaming stateful operator (see DESIGN.md "Layering")."""
