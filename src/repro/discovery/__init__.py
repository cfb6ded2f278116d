"""Discovery engines: joins, PK-FK, unions, EKG, SRQL, Doc-to-Table."""
