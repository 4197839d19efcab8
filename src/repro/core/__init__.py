"""GraSorw system facade, benchmark task definitions, table runners."""
