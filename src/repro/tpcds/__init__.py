"""TPC-DS-lite: snowflake-schema generator (``synth``) and query workload
(``queries``)."""
