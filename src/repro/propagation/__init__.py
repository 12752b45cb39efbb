"""Label-propagation substrate: LinBP (linearized belief propagation) and the
homophily-only random-walk baseline, both expressed as Spark DataFrame
dataflow over the symmetric edges DataFrame."""
