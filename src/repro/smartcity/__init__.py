"""Smart-city dataset substrate: synthetic generators for the paper's
four demo datasets (Santander, China6, China13, COVID-19), the CSV
schemas of §3.2, and the chunked upload pipeline."""
from repro.smartcity.generator import (  # noqa: F401
    SmartCityData,
    china6,
    china13,
    covid19,
    santander,
)
